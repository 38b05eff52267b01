package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Scored, TopK}
import repro.linalg.VecOps
import repro.retrieval.RetrievalData

class FlatSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(800, 16, seed = 3)
  private lazy val flat = new Flat(corpus.vectors, corpus.ids)

  test("returns exactly k results sorted descending") {
    val got = flat.search(corpus.vectors(0), 10)
    assert(got.length == 10)
    assert(got.sliding(2).forall(p => p(0).score >= p(1).score))
  }

  test("matches an independent full-sort implementation") {
    val q = corpus.vectors(5)
    val expected = corpus.vectors.indices
      .map(i => Scored(i.toLong, VecOps.dot(q, corpus.vectors(i))))
      .sorted(TopK.ordering).take(10)
    assert(flat.search(q, 10).toSeq == expected.toSeq)
  }

  test("a corpus vector is its own nearest neighbor") {
    for (i <- Seq(0, 17, 399, 799))
      assert(flat.search(corpus.vectors(i), 1)(0).id == i.toLong)
  }

  test("k larger than corpus returns the whole corpus ranked") {
    val got = flat.search(corpus.vectors(1), 10_000)
    assert(got.length == corpus.n)
  }

  test("deterministic across calls") {
    val q = corpus.vectors(9)
    assert(flat.search(q, 20).toSeq == flat.search(q, 20).toSeq)
  }

  test("name matches the paper's table label") {
    assert(flat.name == "Flat")
  }
}
