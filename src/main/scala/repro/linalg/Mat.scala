package repro.linalg

/** Minimal dense row-major double matrix for the small (d×d, d ≤ a few
  * hundred) problems in this repo: covariance matrices for PCA, Procrustes
  * rotations for OPQ. Not a general linalg library — just what the
  * substrates need, built from scratch (no Breeze/MLlib).
  */
final class Mat(val rows: Int, val cols: Int, val data: Array[Double]) {
  require(data.length == rows * cols, s"bad shape ${rows}x$cols vs ${data.length}")

  def apply(i: Int, j: Int): Double = data(i * cols + j)
  def update(i: Int, j: Int, v: Double): Unit = data(i * cols + j) = v

  def copy: Mat = new Mat(rows, cols, data.clone())

  def t: Mat = {
    val out = Mat.zeros(cols, rows)
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { out(j, i) = this(i, j); j += 1 }; i += 1 }
    out
  }

  def *(other: Mat): Mat = {
    require(cols == other.rows, s"shape mismatch ${rows}x$cols * ${other.rows}x${other.cols}")
    val out = Mat.zeros(rows, other.cols)
    var i = 0
    while (i < rows) {
      var k = 0
      while (k < cols) {
        val a = this(i, k)
        if (a != 0.0) {
          var j = 0
          while (j < other.cols) { out(i, j) += a * other(k, j); j += 1 }
        }
        k += 1
      }
      i += 1
    }
    out
  }

  /** y = M x for a float vector, returning floats (rotation application). */
  def applyTo(x: Array[Float]): Array[Float] = {
    require(cols == x.length)
    val out = new Array[Float](rows)
    var i = 0
    while (i < rows) {
      var s = 0.0; var j = 0
      while (j < cols) { s += this(i, j) * x(j); j += 1 }
      out(i) = s.toFloat
      i += 1
    }
    out
  }

  def maxAbsDiff(other: Mat): Double = {
    var m = 0.0; var i = 0
    while (i < data.length) { m = math.max(m, math.abs(data(i) - other.data(i))); i += 1 }
    m
  }
}

object Mat {
  def zeros(rows: Int, cols: Int): Mat = new Mat(rows, cols, new Array[Double](rows * cols))

  def eye(n: Int): Mat = {
    val m = zeros(n, n)
    var i = 0
    while (i < n) { m(i, i) = 1.0; i += 1 }
    m
  }

  def fromRows(rows: Array[Array[Double]]): Mat = {
    val r = rows.length; val c = rows(0).length
    val m = zeros(r, c)
    var i = 0
    while (i < r) { System.arraycopy(rows(i), 0, m.data, i * c, c); i += 1 }
    m
  }
}
