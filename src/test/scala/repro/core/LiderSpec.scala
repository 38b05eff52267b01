package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.Flat
import repro.retrieval.{Metrics, RetrievalData}

class LiderSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(2000, 32, seed = 77)
  private lazy val params = LiderParams(
    c = 20, c0 = 5,
    centroidCore = CoreModelParams(numArrays = 6, rmiWidth = 4, r0 = 3),
    clusterCore = CoreModelParams(numArrays = 6, rmiWidth = 4, r0 = 3),
    kmeansSample = 2000, kmeansIters = 8)
  private lazy val (lider, stats) = Lider.build(corpus.vectors, corpus.ids, params)
  private lazy val flat = new Flat(corpus.vectors, corpus.ids)

  test("build produces the requested number of clusters") {
    assert(lider.numClusters == 20)
    assert(lider.kmeans.k == 20)
  }

  test("every corpus vector lives in exactly one in-cluster retriever") {
    val counts = lider.inClusterRetrievers.filter(_ != null).map(_.size)
    assert(counts.sum == corpus.n)
    val allIds = lider.inClusterRetrievers.filter(_ != null).flatMap(_.globalIds).sorted
    assert(allIds.toSeq == corpus.ids.toSeq)
  }

  test("centroids retriever indexes the centroids with cluster-id labels") {
    assert(lider.centroidsRetriever.size == 20)
    assert(lider.centroidsRetriever.globalIds.sorted.toSeq == (0L until 20L))
  }

  test("build stats report positive stage times") {
    assert(stats.clusteringNanos > 0)
    assert(stats.centroidRetrieverNanos > 0)
    assert(stats.inClusterNanos > 0)
  }

  test("targetClusters returns at most c0 existing clusters") {
    val t = lider.targetClusters(corpus.vectors(0), 5)
    assert(t.length <= 5)
    assert(t.forall(cid => lider.inClusterRetrievers(cid) != null))
  }

  test("search returns k sorted results") {
    val got = lider.search(corpus.vectors(5), 10)
    assert(got.length == 10)
    assert(got.sliding(2).forall(p => p(0).score >= p(1).score))
  }

  test("self-retrieval: a corpus vector finds itself at rank 1 usually") {
    var hits = 0
    for (i <- 0 until 50) {
      val got = lider.search(corpus.vectors(i * 13), 5)
      if (got.nonEmpty && got(0).id == i * 13) hits += 1
    }
    assert(hits >= 45, s"self-top $hits / 50")
  }

  test("recall@10 vs Flat is reasonable on clusterable data") {
    val recalls = (0 until 40).map { i =>
      val q = corpus.vectors(i * 17 + 1)
      Metrics.recallAt(lider.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }
    val mean = recalls.sum / recalls.length
    assert(mean > 0.5, s"mean recall = $mean")
  }

  test("raising c0 can only widen the searched space (recall non-decreasing on average)") {
    val qs = (0 until 30).map(i => corpus.vectors(i * 11 + 3))
    def meanRecall(c0: Int): Double = qs.map { q =>
      Metrics.recallAt(lider.search(q, 10, c0Override = c0).map(_.id),
        flat.search(q, 10).map(_.id), 10)
    }.sum / qs.size
    assert(meanRecall(10) >= meanRecall(1) - 1e-9)
  }

  test("search merges are deterministic across repeated calls") {
    val q = corpus.vectors(99)
    assert(lider.search(q, 10).toSeq == lider.search(q, 10).toSeq)
  }

  test("results come only from target clusters") {
    val q = corpus.vectors(123)
    val targets = lider.targetClusters(q, params.c0).toSet
    val memberOf = new Array[Int](corpus.n)
    lider.inClusterRetrievers.zipWithIndex.foreach { case (cm, cid) =>
      if (cm != null) cm.globalIds.foreach(id => memberOf(id.toInt) = cid)
    }
    lider.search(q, 10).foreach(s => assert(targets.contains(memberOf(s.id.toInt))))
  }

  test("recommendedC targets ~200-vector clusters with a floor") {
    assert(Lider.recommendedC(100) == 10)
    assert(Lider.recommendedC(40_000) == 200)
  }

  test("recommendedC0 is c/50 floored at 3") {
    assert(Lider.recommendedC0(20) == 3)
    assert(Lider.recommendedC0(1000) == 20)
  }
}
