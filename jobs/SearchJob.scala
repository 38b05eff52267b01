package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.datasource.LiderSearch

/** spark-submit entrypoint running ANN queries through the LIDER
  * DataSource V2 (the distributed-dataflow query path). Usage:
  *
  *   spark-submit --class repro.jobs.SearchJob repro.jar \
  *     <indexDir> <queriesParquet> [k] [outParquet]
  *
  * `queriesParquet` must have schema (id: long, emb: array<float>).
  */
object SearchJob {
  def main(args: Array[String]): Unit = {
    require(args.length >= 2, "usage: SearchJob <indexDir> <queriesParquet> [k] [outParquet]")
    val Array(indexDir, queriesPath) = args.take(2)
    val k = args.lift(2).map(_.toInt).getOrElse(10)

    val spark = SparkSession.builder().appName("lider-search").getOrCreate()
    val topK = LiderSearch.topK(spark, indexDir, queriesPath, k)
    args.lift(3) match {
      case Some(out) =>
        topK.write.mode("overwrite").parquet(out)
        Console.err.println(s"[search] top-$k written to $out")
      case None =>
        topK.orderBy("query_id", "rank").show(100, truncate = false)
    }
    spark.stop()
  }
}
