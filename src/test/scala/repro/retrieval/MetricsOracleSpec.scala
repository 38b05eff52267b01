package repro.retrieval

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.baselines.Flat

/** Checks our metric implementations against DuckDB SQL formulations over
  * real retrieval runs — a wrong MRR/top-k merge would invalidate every
  * number in EXPERIMENTS.md.
  */
class MetricsOracleSpec extends SparkSpec {

  private lazy val corpus = RetrievalData.corpus(800, 16, seed = 41)
  private lazy val task = RetrievalData.pointTask(corpus, 60, seed = 2)
  private lazy val runs: Array[Array[Long]] = {
    val flat = new Flat(corpus.vectors, corpus.ids)
    task.queries.map(q => flat.search(q, 10).map(_.id))
  }

  test("MRR@10 equals the DuckDB SQL formulation") {
    import spark.implicits._
    val resultsDf = runs.zipWithIndex.flatMap { case (ranked, qi) =>
      ranked.zipWithIndex.map { case (pid, r) => (qi.toLong, pid, r + 1) }
    }.toSeq.toDF("query_id", "passage_id", "rank")
    val qrelsDf = task.relevant.zipWithIndex
      .map { case (pid, qi) => (qi.toLong, pid) }.toSeq.toDF("query_id", "passage_id")

    val scalaMrr = Metrics.mrrAt(runs, task.relevant)
    val got = spark.createDataset(Seq(BigDecimal(scalaMrr).setScale(6, BigDecimal.RoundingMode.HALF_UP).toDouble))
      .toDF("mrr")

    Oracle.assertEquivalent(
      got,
      """SELECT round(sum(rr) / (SELECT count(*) FROM qrels), 6) AS mrr FROM (
        |  SELECT q.query_id, coalesce(max(1.0 / CAST(r.rank AS DOUBLE)), 0.0) AS rr
        |  FROM qrels q LEFT JOIN results r
        |    ON CAST(q.query_id AS BIGINT) = CAST(r.query_id AS BIGINT)
        |   AND CAST(q.passage_id AS BIGINT) = CAST(r.passage_id AS BIGINT)
        |   AND CAST(r.rank AS INT) <= 10
        |  GROUP BY q.query_id
        |)""".stripMargin,
      "results" -> resultsDf,
      "qrels" -> qrelsDf)
  }

  test("per-query reciprocal ranks equal the DuckDB join formulation") {
    import spark.implicits._
    val resultsDf = runs.zipWithIndex.flatMap { case (ranked, qi) =>
      ranked.zipWithIndex.map { case (pid, r) => (qi.toLong, pid, r + 1) }
    }.toSeq.toDF("query_id", "passage_id", "rank")
    val qrelsDf = task.relevant.zipWithIndex
      .map { case (pid, qi) => (qi.toLong, pid) }.toSeq.toDF("query_id", "passage_id")

    val got = runs.indices.map { qi =>
      (qi.toLong,
        BigDecimal(Metrics.reciprocalRank(runs(qi), Set(task.relevant(qi))))
          .setScale(6, BigDecimal.RoundingMode.HALF_UP).toDouble)
    }.toDF("query_id", "rr")

    Oracle.assertEquivalent(
      got,
      """SELECT CAST(q.query_id AS BIGINT) AS query_id,
        |       round(coalesce(max(1.0 / CAST(r.rank AS DOUBLE)), 0.0), 6) AS rr
        |FROM qrels q LEFT JOIN results r
        |  ON CAST(q.query_id AS BIGINT) = CAST(r.query_id AS BIGINT)
        | AND CAST(q.passage_id AS BIGINT) = CAST(r.passage_id AS BIGINT)
        | AND CAST(r.rank AS INT) <= 10
        |GROUP BY q.query_id""".stripMargin,
      "results" -> resultsDf,
      "qrels" -> qrelsDf)
  }

  test("recall@10 of Flat against itself is exactly 1 for every query (oracle-free sanity)") {
    runs.foreach(r => assert(Metrics.recallAt(r, r, 10) == 1.0))
  }
}
