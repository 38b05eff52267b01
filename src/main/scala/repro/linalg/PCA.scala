package repro.linalg

/** Principal component analysis over a sample of embeddings, built on the
  * Jacobi eigensolver. Used by the PCA-PQ baseline (paper §7.1.2 baseline 4,
  * which reduces 768-d data to 192-d before PQ; we reduce dim → dim/4
  * at our scaled dimensionality).
  */
final class PCA(val mean: Array[Double], val components: Mat) {
  /** Projects onto the leading `components.rows` principal directions. */
  def transform(x: Array[Float]): Array[Float] = {
    val d = mean.length
    val centered = new Array[Double](d)
    var i = 0
    while (i < d) { centered(i) = x(i) - mean(i); i += 1 }
    val out = new Array[Float](components.rows)
    i = 0
    while (i < components.rows) {
      var s = 0.0; var j = 0
      while (j < d) { s += components(i, j) * centered(j); j += 1 }
      out(i) = s.toFloat
      i += 1
    }
    out
  }

  def outputDim: Int = components.rows
}

object PCA {
  /** Fits PCA keeping `outDim` components from a sample of vectors. */
  def fit(sample: Array[Array[Float]], outDim: Int): PCA = {
    require(sample.nonEmpty, "PCA needs a non-empty sample")
    val n = sample.length
    val d = sample(0).length
    require(outDim <= d, s"outDim $outDim > dim $d")

    val mean = new Array[Double](d)
    sample.foreach { v => var i = 0; while (i < d) { mean(i) += v(i); i += 1 } }
    var i = 0
    while (i < d) { mean(i) /= n; i += 1 }

    val cov = Mat.zeros(d, d)
    sample.foreach { v =>
      val c = new Array[Double](d)
      var a = 0
      while (a < d) { c(a) = v(a) - mean(a); a += 1 }
      a = 0
      while (a < d) {
        val ca = c(a)
        var b = a
        while (b < d) { cov(a, b) += ca * c(b); b += 1 }
        a += 1
      }
    }
    var a = 0
    while (a < d) {
      var b = a
      while (b < d) {
        val v = cov(a, b) / math.max(1, n - 1)
        cov(a, b) = v; cov(b, a) = v
        b += 1
      }
      a += 1
    }

    val (_, vecs) = Eigen.symmetric(cov)
    // Rows of `components` are the top-`outDim` eigenvectors.
    val comp = Mat.zeros(outDim, d)
    var r = 0
    while (r < outDim) {
      var cIdx = 0
      while (cIdx < d) { comp(r, cIdx) = vecs(cIdx, r); cIdx += 1 }
      r += 1
    }
    new PCA(mean, comp)
  }
}
