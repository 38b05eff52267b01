package repro.rmi

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropertySupport

class LinearModelSpec extends AnyFunSuite with PropertySupport {

  test("fits an exact line exactly") {
    val xs = Array(0.0, 1.0, 2.0, 3.0)
    val ys = xs.map(x => 2.5 * x - 1.0)
    val m = LinearModel.fit(xs, ys)
    assert(math.abs(m.slope - 2.5) < 1e-12)
    assert(math.abs(m.intercept + 1.0) < 1e-12)
  }

  test("prediction interpolates the fitted line") {
    val m = LinearModel(3.0, 1.0)
    assert(m.predict(2.0) == 7.0)
  }

  test("recovers slope/intercept under exact linear data (property)") {
    checkProp(Prop.forAll(for {
      a <- Gen.choose(-10.0, 10.0)
      b <- Gen.choose(-10.0, 10.0)
      xs <- Gen.listOfN(20, Gen.choose(-100.0, 100.0))
    } yield (a, b, xs.toArray)) { case (a, b, xs) =>
      val distinct = xs.distinct
      distinct.length < 2 || {
        val m = LinearModel.fit(distinct, distinct.map(x => a * x + b))
        math.abs(m.slope - a) < 1e-6 && math.abs(m.intercept - b) < 1e-4
      }
    })
  }

  test("constant labels give zero slope") {
    val m = LinearModel.fit(Array(1.0, 2.0, 3.0), Array(5.0, 5.0, 5.0))
    assert(m.slope == 0.0 && m.intercept == 5.0)
  }

  test("degenerate x (no variance) falls back to mean predictor") {
    val m = LinearModel.fit(Array(2.0, 2.0, 2.0), Array(1.0, 3.0, 5.0))
    assert(m.slope == 0.0 && m.intercept == 3.0)
  }

  test("empty input yields the zero model") {
    val m = LinearModel.fit(Array.empty[Double], Array.empty[Double])
    assert(m.slope == 0.0 && m.intercept == 0.0)
  }

  test("single point predicts that point's label") {
    val m = LinearModel.fit(Array(4.0), Array(9.0))
    assert(m.predict(123.0) == 9.0)
  }

  test("OLS residuals are centered (property)") {
    checkProp(Prop.forAll(Gen.listOfN(30, Gen.zip(Gen.choose(-50.0, 50.0), Gen.choose(-50.0, 50.0)))) { pts =>
      val xs = pts.map(_._1).toArray; val ys = pts.map(_._2).toArray
      val m = LinearModel.fit(xs, ys)
      val meanResidual = xs.indices.map(i => ys(i) - m.predict(xs(i))).sum / xs.length
      math.abs(meanResidual) < 1e-6
    })
  }

  test("length mismatch rejected") {
    intercept[IllegalArgumentException](LinearModel.fit(Array(1.0), Array(1.0, 2.0)))
  }

  test("fitSGD converges near OLS on well-scaled keys (the re-scaled regime)") {
    val xs = Array.tabulate(500)(i => i * 4.0) // x in [0, 2000] like re-scaled keys
    val ys = Array.tabulate(500)(_.toDouble)
    val sgd = LinearModel.fitSGD(xs, ys)
    val ols = LinearModel.fit(xs, ys)
    assert(math.abs(sgd.slope - ols.slope) < 0.05, s"sgd=$sgd ols=$ols")
    // Mid-range predictions agree closely even if the intercept lags.
    assert(math.abs(sgd.predict(1000.0) - ols.predict(1000.0)) < 50.0)
  }

  test("fitSGD with its fixed learning rate diverges on huge raw keys (the §5.1 failure mode)") {
    val xs = Array.tabulate(500)(i => i * 30000.0) // raw decimal hashkeys ~1.5e7
    val ys = Array.tabulate(500)(_.toDouble)
    val sgd = LinearModel.fitSGD(xs, ys)
    // Diverged parameters throw predictions far out of the label range.
    val p = sgd.predict(xs(250))
    assert(java.lang.Double.isFinite(sgd.slope) && java.lang.Double.isFinite(sgd.intercept))
    assert(p < -500.0 || p > 1000.0, s"prediction $p unexpectedly in range")
  }

  test("fitSGD on empty input yields the zero model") {
    val m = LinearModel.fitSGD(Array.empty[Double], Array.empty[Double])
    assert(m.slope == 0.0 && m.intercept == 0.0)
  }
}
