package repro.retrieval

/** Retrieval quality metrics of the paper's evaluation (§7.1.1):
  * MRR@10 for MS MARCO Dev / Wiki-21M NQ and NDCG@10 for TREC2019 DL.
  */
object Metrics {

  /** Reciprocal rank of the first relevant id within the top `cut`. */
  def reciprocalRank(ranked: Array[Long], relevant: Set[Long], cut: Int = 10): Double = {
    var i = 0
    val lim = math.min(cut, ranked.length)
    while (i < lim) {
      if (relevant.contains(ranked(i))) return 1.0 / (i + 1)
      i += 1
    }
    0.0
  }

  /** Mean reciprocal rank at `cut` over parallel arrays of per-query
    * rankings and single relevant ids (Dev/NQ tasks).
    */
  def mrrAt(results: Array[Array[Long]], relevant: Array[Long], cut: Int = 10): Double = {
    require(results.length == relevant.length)
    if (results.isEmpty) return 0.0
    results.indices.map(i => reciprocalRank(results(i), Set(relevant(i)), cut)).sum / results.length
  }

  /** DCG@cut with the gain function 2^rel − 1 (trec_eval convention). */
  def dcgAt(ranked: Array[Long], qrels: Map[Long, Int], cut: Int): Double = {
    var s = 0.0
    var i = 0
    val lim = math.min(cut, ranked.length)
    while (i < lim) {
      val rel = qrels.getOrElse(ranked(i), 0)
      if (rel > 0) s += ((1 << rel) - 1).toDouble / (math.log(i + 2) / math.log(2))
      i += 1
    }
    s
  }

  /** NDCG@cut for one query; 0 when the query has no positive qrels. */
  def ndcgAt(ranked: Array[Long], qrels: Map[Long, Int], cut: Int = 10): Double = {
    val ideal = qrels.values.toArray.sorted(Ordering.Int.reverse)
    var idcg = 0.0
    var i = 0
    val lim = math.min(cut, ideal.length)
    while (i < lim) {
      if (ideal(i) > 0) idcg += ((1 << ideal(i)) - 1).toDouble / (math.log(i + 2) / math.log(2))
      i += 1
    }
    if (idcg == 0.0) 0.0 else dcgAt(ranked, qrels, cut) / idcg
  }

  /** Mean NDCG@cut over a graded task. */
  def meanNdcgAt(results: Array[Array[Long]], qrels: Array[Map[Long, Int]], cut: Int = 10): Double = {
    require(results.length == qrels.length)
    if (results.isEmpty) return 0.0
    results.indices.map(i => ndcgAt(results(i), qrels(i), cut)).sum / results.length
  }

  /** Recall@k against an exact ground-truth ranking (used by tests to
    * bound approximation quality vs Flat).
    */
  def recallAt(approx: Array[Long], exact: Array[Long], k: Int): Double = {
    if (exact.isEmpty) return 1.0
    val truth = exact.take(k).toSet
    approx.take(k).count(truth.contains).toDouble / truth.size
  }
}
