package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.VecOps
import repro.retrieval.{Metrics, RetrievalData}

class PQSpec extends AnyFunSuite {

  private lazy val corpus = RetrievalData.corpus(1000, 32, seed = 21)
  private lazy val flat = new Flat(corpus.vectors, corpus.ids)

  test("ProductQuantizer encode/decode round-trips with bounded error") {
    val pq = ProductQuantizer.fit(corpus.vectors, m = 4, bits = 6)
    val err = pq.reconstructionError(corpus.vectors.take(200))
    assert(err < 0.5, s"mse=$err") // unit vectors: mse ≪ 2 means codes carry signal
  }

  test("more bits reduce reconstruction error") {
    val lo = ProductQuantizer.fit(corpus.vectors, 4, bits = 2)
    val hi = ProductQuantizer.fit(corpus.vectors, 4, bits = 6)
    assert(hi.reconstructionError(corpus.vectors.take(200)) <
      lo.reconstructionError(corpus.vectors.take(200)))
  }

  test("more segments reduce reconstruction error") {
    val lo = ProductQuantizer.fit(corpus.vectors, 2, bits = 4)
    val hi = ProductQuantizer.fit(corpus.vectors, 8, bits = 4)
    assert(hi.reconstructionError(corpus.vectors.take(200)) <
      lo.reconstructionError(corpus.vectors.take(200)))
  }

  test("adc with IP tables equals dot(q, decode(codes))") {
    val pq = ProductQuantizer.fit(corpus.vectors, 4, 4)
    val q = corpus.vectors(3)
    val lut = pq.lutIP(q)
    for (i <- 0 until 20) {
      val codes = pq.encode(corpus.vectors(i))
      val viaLut = pq.adc(lut, codes, 0)
      val direct = VecOps.dot(q, pq.decode(codes))
      assert(math.abs(viaLut - direct) < 1e-4)
    }
  }

  test("adc with L2 tables equals sqDist(q, decode(codes))") {
    val pq = ProductQuantizer.fit(corpus.vectors, 4, 4)
    val q = corpus.vectors(4)
    val lut = pq.lutL2(q)
    for (i <- 0 until 20) {
      val codes = pq.encode(corpus.vectors(i))
      assert(math.abs(pq.adc(lut, codes, 0) - VecOps.sqDist(q, pq.decode(codes))) < 1e-3)
    }
  }

  test("dim not divisible by m is rejected") {
    intercept[IllegalArgumentException](ProductQuantizer.fit(corpus.vectors, 5, 4))
  }

  test("PQIndex search returns k sorted results with decent recall") {
    val idx = PQIndex.build(corpus.vectors, corpus.ids, m = 8, bits = 6)
    val recalls = (0 until 30).map { i =>
      val q = corpus.vectors(i * 7)
      Metrics.recallAt(idx.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }
    val mean = recalls.sum / recalls.length
    assert(mean > 0.3, s"recall=$mean")
    val got = idx.search(corpus.vectors(0), 10)
    assert(got.length == 10 && got.sliding(2).forall(p => p(0).score >= p(1).score))
  }

  test("OPQ rotation is orthogonal") {
    val opq = OPQIndex.build(corpus.vectors, corpus.ids, m = 4, bits = 4, optIters = 3, trainSample = 400)
    val r = opq.rotation
    assert((r.t * r).maxAbsDiff(repro.linalg.Mat.eye(32)) < 1e-6)
  }

  test("OPQ achieves no worse reconstruction than PQ (paper: OPQ > PQ quality)") {
    // Train both on the full corpus so the comparison shares data; OPQ's
    // iteration 0 is the identity rotation, so it can only improve on PQ.
    val pq = ProductQuantizer.fit(corpus.vectors, 4, 4, iters = 8, seed = 1)
    val opq = OPQIndex.build(corpus.vectors, corpus.ids, 4, 4, optIters = 5,
      trainSample = corpus.n, seed = 1)
    val pqErr = pq.reconstructionError(corpus.vectors)
    val rotated = corpus.vectors.map(opq.rotation.applyTo)
    val opqErr = opq.pq.reconstructionError(rotated)
    assert(opqErr <= pqErr * 1.02, s"opq=$opqErr pq=$pqErr")
  }

  test("OPQ search works end to end") {
    val opq = OPQIndex.build(corpus.vectors, corpus.ids, 8, 6, optIters = 3, trainSample = 500)
    val recalls = (0 until 20).map { i =>
      val q = corpus.vectors(i * 11)
      Metrics.recallAt(opq.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }
    assert(recalls.sum / recalls.length > 0.3)
  }

  test("PCA-PQ search works end to end") {
    val idx = PCAPQIndex.build(corpus.vectors, corpus.ids, outDim = 8, m = 4, bits = 6)
    val recalls = (0 until 20).map { i =>
      val q = corpus.vectors(i * 13)
      Metrics.recallAt(idx.search(q, 10).map(_.id), flat.search(q, 10).map(_.id), 10)
    }
    assert(recalls.sum / recalls.length > 0.2, s"recall=${recalls.sum / recalls.length}")
  }

  test("index names match the paper's labels") {
    assert(PQIndex.build(corpus.vectors.take(100), corpus.ids.take(100), 4, 4).name == "PQ")
    assert(PCAPQIndex.build(corpus.vectors.take(100), corpus.ids.take(100), 8, 4, 4).name == "PCA-PQ")
  }
}
