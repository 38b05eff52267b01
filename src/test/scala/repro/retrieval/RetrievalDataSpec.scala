package repro.retrieval

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.VecOps

class RetrievalDataSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(1000, 24, seed = 5)

  test("corpus has the requested size and dimension") {
    assert(corpus.n == 1000)
    assert(corpus.vectors.forall(_.length == 24))
  }

  test("all passage embeddings are unit-normalized") {
    corpus.vectors.foreach(v => assert(math.abs(VecOps.norm(v) - 1.0) < 1e-4))
  }

  test("generation is deterministic in (n, dim, seed)") {
    val again = RetrievalData.corpus(1000, 24, seed = 5)
    assert(corpus.vectors.zip(again.vectors).forall { case (a, b) => a.sameElements(b) })
  }

  test("different seeds give different corpora") {
    val other = RetrievalData.corpus(1000, 24, seed = 6)
    assert(!corpus.vectors(0).sameElements(other.vectors(0)))
  }

  test("topic structure exists: passages are on average closer to some passages than random chance") {
    // Nearest-neighbor similarity should far exceed mean pairwise similarity.
    val q = corpus.vectors(0)
    val sims = (1 until corpus.n).map(i => VecOps.dot(q, corpus.vectors(i)))
    assert(sims.max > sims.sum / sims.length + 0.3)
  }

  test("pointTask queries are normalized and reference valid non-planted passages") {
    val task = RetrievalData.pointTask(corpus, 100, seed = 9)
    assert(task.queries.length == 100)
    task.queries.foreach(q => assert(math.abs(VecOps.norm(q) - 1.0) < 1e-4))
    val plantedStart = corpus.n - RetrievalData.TrecQueries * RetrievalData.trecPlantPerQuery(corpus.n)
    task.relevant.foreach(r => assert(r >= 0 && r < plantedStart))
  }

  test("pointTask relevant passages are distinct") {
    val task = RetrievalData.pointTask(corpus, 200, seed = 11)
    assert(task.relevant.distinct.length == task.relevant.length)
  }

  test("queries are overwhelmingly closer to their relevant passage than to a random one") {
    // Not universally true by design: the hardest queries (σ_q near
    // QuerySigmaMax) sit down in the distractor band — that is what makes
    // retrieval quality fall with corpus size.
    val task = RetrievalData.pointTask(corpus, 100, seed = 13)
    val wins = task.queries.zip(task.relevant).count { case (q, rel) =>
      val simRel = VecOps.dot(q, corpus.vectors(rel.toInt))
      val simRand = VecOps.dot(q, corpus.vectors(((rel + 123) % corpus.n).toInt))
      simRel > simRand
    }
    assert(wins >= 90, s"wins=$wins / 100")
  }

  test("gradedTask produces 43 queries with full qrel blocks") {
    val task = RetrievalData.gradedTask(corpus, seed = 5)
    assert(task.queries.length == RetrievalData.TrecQueries)
    val plant = RetrievalData.trecPlantPerQuery(corpus.n)
    task.qrels.foreach { qr =>
      assert(qr.size == plant)
      assert(qr.values.forall(g => g >= 1 && g <= 3))
      assert(qr.values.toSeq.count(_ == 3) >= 1)
    }
  }

  test("gradedTask qrel ids point at the planted tail block") {
    val task = RetrievalData.gradedTask(corpus, seed = 5)
    val plant = RetrievalData.trecPlantPerQuery(corpus.n)
    val start = corpus.n - RetrievalData.TrecQueries * plant
    task.qrels.flatMap(_.keys).foreach(id => assert(id >= start && id < corpus.n))
  }

  test("higher-grade planted passages are closer to their query on average") {
    val big = RetrievalData.corpus(5000, 24, seed = 7)
    val task = RetrievalData.gradedTask(big, seed = 7)
    var s3 = 0.0; var n3 = 0; var s1 = 0.0; var n1 = 0
    task.queries.zip(task.qrels).foreach { case (q, qr) =>
      qr.foreach { case (pid, g) =>
        val sim = VecOps.dot(q, big.vectors(pid.toInt))
        if (g == 3) { s3 += sim; n3 += 1 }
        if (g == 1) { s1 += sim; n1 += 1 }
      }
    }
    assert(s3 / n3 > s1 / n1, s"grade3 mean ${s3 / n3} vs grade1 mean ${s1 / n1}")
  }

  test("numTopics grows like sqrt(n)") {
    assert(RetrievalData.numTopics(100) == 10)
    assert(RetrievalData.numTopics(10000) == 100)
  }

  test("too-small corpora are rejected") {
    intercept[IllegalArgumentException](RetrievalData.corpus(60, 8, seed = 1))
  }
}
