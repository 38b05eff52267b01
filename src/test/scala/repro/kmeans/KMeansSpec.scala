package repro.kmeans

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.VecOps
import scala.util.Random

class KMeansSpec extends AnyFunSuite {

  /** Three well-separated blobs in 2D. */
  private def blobs(perBlob: Int, seed: Long): (Array[Array[Float]], Array[Int]) = {
    val centers = Array(Array(0f, 0f), Array(10f, 0f), Array(0f, 10f))
    val rnd = new Random(seed)
    val data = new Array[Array[Float]](perBlob * 3)
    val truth = new Array[Int](perBlob * 3)
    for (b <- 0 until 3; i <- 0 until perBlob) {
      val idx = b * perBlob + i
      data(idx) = Array(
        centers(b)(0) + rnd.nextGaussian().toFloat * 0.5f,
        centers(b)(1) + rnd.nextGaussian().toFloat * 0.5f)
      truth(idx) = b
    }
    (data, truth)
  }

  test("recovers well-separated blobs") {
    val (data, truth) = blobs(100, 1)
    val model = KMeans.fit(data, 3, seed = 5)
    val assign = KMeans.assign(model, data)
    // Every true blob must map to exactly one predicted cluster.
    val mapping = (0 until 3).map { b =>
      val members = truth.indices.filter(truth(_) == b).map(assign)
      members.groupBy(identity).maxBy(_._2.size)._1
    }
    assert(mapping.distinct.size == 3, s"blob→cluster mapping collided: $mapping")
    val purity = truth.indices.count(i => assign(i) == mapping(truth(i))).toDouble / truth.length
    assert(purity > 0.98, s"purity $purity")
  }

  test("centroids land near the true blob centers") {
    val (data, _) = blobs(200, 2)
    val model = KMeans.fit(data, 3, seed = 6)
    val trueCenters = Array(Array(0f, 0f), Array(10f, 0f), Array(0f, 10f))
    trueCenters.foreach { tc =>
      val nearest = model.centroids.map(c => VecOps.sqDist(c, tc)).min
      assert(nearest < 0.5, s"no centroid near ${tc.toSeq}")
    }
  }

  test("k capped at data size") {
    val data = Array(Array(1f, 1f), Array(2f, 2f))
    val model = KMeans.fit(data, 10)
    assert(model.k <= 2)
  }

  test("nearest returns the closest centroid") {
    val model = KMeansModel(Array(Array(0f, 0f), Array(10f, 10f)))
    assert(model.nearest(Array(1f, 1f)) == 0)
    assert(model.nearest(Array(9f, 9f)) == 1)
  }

  test("nearestN orders centroids by distance") {
    val model = KMeansModel(Array(Array(0f, 0f), Array(5f, 0f), Array(10f, 0f)))
    assert(model.nearestN(Array(6f, 0f), 3).toSeq == Seq(1, 2, 0))
  }

  test("nearestN caps at k centroids") {
    val model = KMeansModel(Array(Array(0f, 0f), Array(5f, 0f)))
    assert(model.nearestN(Array(1f, 1f), 10).length == 2)
  }

  test("assign agrees with nearest for every point") {
    val (data, _) = blobs(50, 3)
    val model = KMeans.fit(data, 3, seed = 7)
    val assign = KMeans.assign(model, data)
    data.indices.foreach(i => assert(assign(i) == model.nearest(data(i))))
  }

  test("fit is deterministic in the seed") {
    val (data, _) = blobs(80, 4)
    val a = KMeans.fit(data, 3, seed = 9).centroids
    val b = KMeans.fit(data, 3, seed = 9).centroids
    assert(a.zip(b).forall { case (x, y) => x.sameElements(y) })
  }

  test("lloyd iterations do not increase inertia") {
    val (data, _) = blobs(100, 5)
    def inertia(model: KMeansModel): Double =
      data.map(v => VecOps.sqDist(v, model.centroids(model.nearest(v)))).sum
    val short = KMeans.fit(data, 3, maxIters = 1, seed = 11)
    val long = KMeans.fit(data, 3, maxIters = 15, seed = 11)
    assert(inertia(long) <= inertia(short) + 1e-6)
  }

  test("sample bounds the returned size and keeps originals intact") {
    val (data, _) = blobs(100, 6)
    val s = KMeans.sample(data, 50, 1)
    assert(s.length == 50)
    assert(KMeans.sample(data, 1000, 1).length == data.length)
  }

  test("empty input is rejected") {
    intercept[IllegalArgumentException](KMeans.fit(Array.empty[Array[Float]], 3))
  }
}
