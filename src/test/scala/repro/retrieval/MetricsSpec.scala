package repro.retrieval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("reciprocal rank of a hit at rank 1 is 1") {
    assert(Metrics.reciprocalRank(Array(7L, 8L, 9L), Set(7L)) == 1.0)
  }

  test("reciprocal rank of a hit at rank 3 is 1/3") {
    assert(Metrics.reciprocalRank(Array(1L, 2L, 7L), Set(7L)) == 1.0 / 3)
  }

  test("reciprocal rank beyond the cut is 0") {
    val ranked = (1L to 20L).toArray
    assert(Metrics.reciprocalRank(ranked, Set(15L), cut = 10) == 0.0)
  }

  test("first relevant hit wins when several are present") {
    assert(Metrics.reciprocalRank(Array(1L, 5L, 6L), Set(5L, 6L)) == 0.5)
  }

  test("mrrAt averages per-query reciprocal ranks") {
    val results = Array(Array(1L, 2L), Array(9L, 3L), Array(4L, 5L))
    val relevant = Array(1L, 3L, 6L)
    // RRs: 1, 1/2, 0 → mean = 0.5
    assert(Metrics.mrrAt(results, relevant) == 0.5)
  }

  test("mrrAt on empty input is 0") {
    assert(Metrics.mrrAt(Array.empty, Array.empty) == 0.0)
  }

  test("dcg uses gain 2^rel - 1 and log2 discount") {
    val qrels = Map(10L -> 3, 20L -> 1)
    val got = Metrics.dcgAt(Array(10L, 20L), qrels, 10)
    val expected = 7.0 / 1.0 + 1.0 / (math.log(3) / math.log(2))
    assert(math.abs(got - expected) < 1e-12)
  }

  test("ndcg of the ideal ranking is 1") {
    val qrels = Map(1L -> 3, 2L -> 2, 3L -> 1)
    assert(math.abs(Metrics.ndcgAt(Array(1L, 2L, 3L), qrels) - 1.0) < 1e-12)
  }

  test("ndcg of a reversed ranking is strictly below 1") {
    val qrels = Map(1L -> 3, 2L -> 2, 3L -> 1)
    val got = Metrics.ndcgAt(Array(3L, 2L, 1L), qrels)
    assert(got < 1.0 && got > 0.0)
  }

  test("ndcg with no relevant retrieved is 0") {
    val qrels = Map(1L -> 2)
    assert(Metrics.ndcgAt(Array(5L, 6L), qrels) == 0.0)
  }

  test("ndcg with empty qrels is 0 by convention") {
    assert(Metrics.ndcgAt(Array(1L), Map.empty) == 0.0)
  }

  test("ndcg respects the cut: hits after position 10 do not count") {
    val qrels = Map(99L -> 3)
    val ranked = ((1L to 10L) :+ 99L).toArray
    assert(Metrics.ndcgAt(ranked, qrels, cut = 10) == 0.0)
  }

  test("meanNdcgAt averages per-query ndcg") {
    val results = Array(Array(1L), Array(9L))
    val qrels = Array(Map(1L -> 3), Map(2L -> 3))
    assert(Metrics.meanNdcgAt(results, qrels) == 0.5)
  }

  test("recallAt counts overlap with exact top-k") {
    val exact = Array(1L, 2L, 3L, 4L)
    val approx = Array(2L, 9L, 4L, 8L)
    assert(Metrics.recallAt(approx, exact, 4) == 0.5)
  }

  test("recallAt of identical rankings is 1") {
    val xs = Array(5L, 6L, 7L)
    assert(Metrics.recallAt(xs, xs, 3) == 1.0)
  }

  test("recallAt with empty exact ranking is 1 by convention") {
    assert(Metrics.recallAt(Array(1L), Array.empty, 5) == 1.0)
  }
}
