package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.retrieval.{Metrics, RetrievalData}

class IVFPQSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(1200, 32, seed = 33)
  private lazy val flat = new Flat(corpus.vectors, corpus.ids)
  private lazy val idx = IVFPQIndex.build(corpus.vectors, corpus.ids,
    numCoarse = 35, m = 8, bits = 6, probes = 8, useHnsw = false)
  private lazy val idxHnsw = IVFPQIndex.build(corpus.vectors, corpus.ids,
    numCoarse = 35, m = 8, bits = 6, probes = 8, useHnsw = true)

  test("names match the paper's labels") {
    assert(idx.name == "IVFPQ")
    assert(idxHnsw.name == "IVFPQ-HNSW")
  }

  test("search returns k sorted results") {
    val got = idx.search(corpus.vectors(0), 10)
    assert(got.length == 10)
    assert(got.sliding(2).forall(p => p(0).score >= p(1).score))
  }

  test("recall@10 vs Flat is non-trivial") {
    val recalls = (0 until 30).map { i =>
      val q = corpus.vectors(i * 7 + 1)
      Metrics.recallAt(idx.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }
    val mean = recalls.sum / recalls.length
    assert(mean > 0.25, s"recall=$mean")
  }

  test("probing more lists does not reduce average recall") {
    val narrow = IVFPQIndex.build(corpus.vectors, corpus.ids, 35, 8, 6, probes = 2, useHnsw = false)
    val wide = IVFPQIndex.build(corpus.vectors, corpus.ids, 35, 8, 6, probes = 20, useHnsw = false)
    def meanRecall(ix: IVFPQIndex): Double = (0 until 25).map { i =>
      val q = corpus.vectors(i * 11 + 2)
      Metrics.recallAt(ix.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }.sum / 25
    assert(meanRecall(wide) >= meanRecall(narrow) - 0.05)
  }

  test("HNSW coarse assignment probes mostly the same lists as exact assignment") {
    var overlap = 0.0
    for (i <- 0 until 20) {
      val q = corpus.vectors(i * 17)
      val exact = idx.probeLists(q).toSet
      val viaHnsw = idxHnsw.probeLists(q).toSet
      overlap += exact.intersect(viaHnsw).size.toDouble / exact.size
    }
    assert(overlap / 20 > 0.7, s"overlap=${overlap / 20}")
  }

  test("HNSW variant reaches comparable recall") {
    def meanRecall(ix: IVFPQIndex): Double = (0 until 25).map { i =>
      val q = corpus.vectors(i * 13 + 5)
      Metrics.recallAt(ix.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }.sum / 25
    assert(math.abs(meanRecall(idxHnsw) - meanRecall(idx)) < 0.25)
  }

  test("every corpus id appears in exactly one inverted list") {
    // search with huge probes must be able to reach all ids
    val all = IVFPQIndex.build(corpus.vectors, corpus.ids, 10, 4, 4, probes = 10, useHnsw = false)
    val got = all.search(corpus.vectors(0), corpus.n)
    assert(got.map(_.id).distinct.length == corpus.n)
  }
}
