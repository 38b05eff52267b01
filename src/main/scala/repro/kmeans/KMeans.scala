package repro.kmeans

import repro.linalg.{Parallel, VecOps}
import scala.util.Random

/** Lloyd's k-means with k-means++ seeding, written from scratch.
  *
  * This is the clustering substrate used by
  *  - LIDER Stage 1 (partition the corpus into `c` clusters, paper §3.2),
  *  - the PQ family (per-segment codebooks),
  *  - IVFPQ's coarse quantizer.
  *
  * Training runs on a bounded sample (like FAISS' default practice, which
  * the paper's baselines inherit); assignment of the full corpus is a single
  * parallel pass via [[assign]].
  */
final case class KMeansModel(centroids: Array[Array[Float]]) {
  def k: Int = centroids.length
  def dim: Int = centroids(0).length

  /** Index of the nearest centroid by squared Euclidean distance. */
  def nearest(v: Array[Float]): Int = {
    var best = 0; var bestD = Double.MaxValue
    var c = 0
    while (c < centroids.length) {
      val d = VecOps.sqDist(v, centroids(c))
      if (d < bestD) { bestD = d; best = c }
      c += 1
    }
    best
  }

  /** Indices of the `n` nearest centroids, closest first. */
  def nearestN(v: Array[Float], n: Int): Array[Int] = {
    val ds = Array.tabulate(centroids.length)(c => (VecOps.sqDist(v, centroids(c)), c))
    ds.sortBy(_._1).take(math.min(n, centroids.length)).map(_._2)
  }
}

object KMeans {

  /** Fits `k` centroids on `data` (typically a sample of the corpus).
    *
    * @param k        requested number of centroids; silently capped at
    *                 `data.length` (a cluster cannot be emptier than 1 seed)
    * @param maxIters Lloyd's iterations; stops early when assignments settle
    */
  def fit(data: Array[Array[Float]], k: Int, maxIters: Int = 15, seed: Long = 42L): KMeansModel = {
    require(data.nonEmpty, "k-means needs data")
    val kk = math.min(k, data.length)
    val dim = data(0).length
    var centroids = seedPlusPlus(data, kk, seed)

    val assign = new Array[Int](data.length)
    var iter = 0
    var changed = true
    while (iter < maxIters && changed) {
      val cs = centroids
      val newAssign = Parallel.tabulate(data.length) { i =>
        var best = 0; var bestD = Double.MaxValue
        var c = 0
        while (c < cs.length) {
          val d = VecOps.sqDist(data(i), cs(c))
          if (d < bestD) { bestD = d; best = c }
          c += 1
        }
        best
      }
      changed = !java.util.Arrays.equals(newAssign, assign)
      System.arraycopy(newAssign, 0, assign, 0, assign.length)

      val sums = Array.fill(kk)(new Array[Double](dim))
      val counts = new Array[Long](kk)
      var i = 0
      while (i < data.length) {
        val c = assign(i)
        VecOps.addInPlace(sums(c), data(i))
        counts(c) += 1
        i += 1
      }
      val rnd = new Random(seed + iter)
      centroids = Array.tabulate(kk) { c =>
        if (counts(c) == 0) data(rnd.nextInt(data.length)).clone() // re-seed empty cluster
        else VecOps.mean(sums(c), counts(c))
      }
      iter += 1
    }
    KMeansModel(centroids)
  }

  /** k-means++ seeding (squared-distance-weighted draws). */
  private def seedPlusPlus(data: Array[Array[Float]], k: Int, seed: Long): Array[Array[Float]] = {
    val rnd = new Random(seed)
    val out = new Array[Array[Float]](k)
    out(0) = data(rnd.nextInt(data.length)).clone()
    val minD = Array.fill(data.length)(Double.MaxValue)
    var c = 1
    while (c < k) {
      val prev = out(c - 1)
      Parallel.foreachRange(data.length) { i =>
        val d = VecOps.sqDist(data(i), prev)
        if (d < minD(i)) minD(i) = d
      }
      val total = minD.sum
      out(c) =
        if (total <= 0.0) data(rnd.nextInt(data.length)).clone()
        else {
          var target = rnd.nextDouble() * total
          var i = 0
          while (i < data.length - 1 && target > minD(i)) { target -= minD(i); i += 1 }
          data(i).clone()
        }
      c += 1
    }
    out
  }

  /** Parallel nearest-centroid assignment of the full corpus. */
  def assign(model: KMeansModel, data: Array[Array[Float]]): Array[Int] =
    Parallel.tabulate(data.length)(i => model.nearest(data(i)))

  /** Uniform sample without replacement (bounded by `maxSample`). */
  def sample(data: Array[Array[Float]], maxSample: Int, seed: Long): Array[Array[Float]] = {
    if (data.length <= maxSample) data
    else {
      val rnd = new Random(seed)
      val idx = rnd.shuffle((0 until data.length).toVector).take(maxSample)
      idx.map(data).toArray
    }
  }
}
