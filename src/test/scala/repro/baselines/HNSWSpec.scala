package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.VecOps
import scala.util.Random

class HNSWSpec extends AnyFunSuite {

  private def randomVecs(n: Int, dim: Int, seed: Long): Array[Array[Float]] = {
    val rnd = new Random(seed)
    Array.fill(n)(Array.fill(dim)(rnd.nextGaussian().toFloat))
  }

  private def exactKnn(data: Array[Array[Float]], q: Array[Float], k: Int): Array[Int] =
    data.indices.map(i => (VecOps.sqDist(q, data(i)), i)).sortBy(_._1).take(k).map(_._2).toArray

  private lazy val data = randomVecs(800, 16, seed = 5)
  private lazy val graph = new HNSW(data, m = 12, efConstruction = 80, seed = 7)

  test("searchKnn returns k distinct in-range indices") {
    val got = graph.searchKnn(data(0), 10, ef = 50)
    assert(got.length == 10)
    assert(got.distinct.length == 10)
    assert(got.forall(i => i >= 0 && i < data.length))
  }

  test("a corpus vector finds itself first") {
    for (i <- Seq(0, 100, 500, 799))
      assert(graph.searchKnn(data(i), 1, ef = 50)(0) == i)
  }

  test("recall@10 vs exact is high with generous ef") {
    val recalls = (0 until 30).map { i =>
      val q = data(i * 13)
      val exact = exactKnn(data, q, 10).toSet
      val approx = graph.searchKnn(q, 10, ef = 100)
      approx.count(exact.contains).toDouble / 10
    }
    val mean = recalls.sum / recalls.length
    assert(mean > 0.85, s"recall=$mean")
  }

  test("larger ef does not reduce average recall") {
    def meanRecall(ef: Int): Double = (0 until 20).map { i =>
      val q = randomVecs(1, 16, seed = 100 + i)(0)
      val exact = exactKnn(data, q, 10).toSet
      graph.searchKnn(q, 10, ef).count(exact.contains).toDouble / 10
    }.sum / 20
    assert(meanRecall(120) >= meanRecall(10) - 0.05)
  }

  test("results are ordered by increasing distance") {
    val q = data(42)
    val got = graph.searchKnn(q, 10, ef = 60)
    val ds = got.map(i => VecOps.sqDist(q, data(i)))
    assert(ds.sliding(2).forall(p => p(0) <= p(1)))
  }

  test("empty graph returns empty results") {
    val g = new HNSW(Array.empty[Array[Float]], 8, 32, 1)
    assert(g.searchKnn(Array.fill(16)(0f), 5, 32).isEmpty)
  }

  test("tiny graph returns everything") {
    val tiny = randomVecs(5, 8, 9)
    val g = new HNSW(tiny, 4, 16, 2)
    assert(g.searchKnn(tiny(0), 5, 16).sorted.toSeq == (0 until 5).toSeq)
  }
}
