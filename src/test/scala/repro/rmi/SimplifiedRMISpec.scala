package repro.rmi

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SimplifiedRMISpec extends AnyFunSuite {

  test("perfectly linear keys are predicted exactly") {
    val keys = Array.tabulate(100)(i => i * 2.0)
    val rmi = SimplifiedRMI.fit(keys, width = 4)
    keys.indices.foreach(i => assert(rmi.predict(keys(i)) == i.toLong))
  }

  test("predictions are clamped to [0, n-1]") {
    val keys = Array.tabulate(50)(_.toDouble)
    val rmi = SimplifiedRMI.fit(keys, 2)
    assert(rmi.predict(-1e9) == 0L)
    assert(rmi.predict(1e9) == 49L)
  }

  test("predictRaw is unclamped") {
    val keys = Array.tabulate(50)(_.toDouble)
    val rmi = SimplifiedRMI.fit(keys, 2)
    assert(rmi.predictRaw(1e6) > 49.0)
    assert(rmi.predictRaw(-1e6) < 0.0)
  }

  test("piecewise-linear keys fit better with more width") {
    // Two regimes: slope 1 then slope 10.
    val keys = Array.tabulate(200)(i => if (i < 100) i.toDouble else 100.0 + (i - 100) * 10.0)
    def maxErr(width: Int): Long = {
      val rmi = SimplifiedRMI.fit(keys, width)
      keys.indices.map(i => math.abs(rmi.predict(keys(i)) - i)).max
    }
    assert(maxErr(8) <= maxErr(1))
  }

  test("error on noisy monotone keys is bounded within a reasonable band") {
    val rnd = new Random(5)
    var acc = 0.0
    val keys = Array.tabulate(500) { _ => acc += rnd.nextDouble(); acc }
    val rmi = SimplifiedRMI.fit(keys, 10)
    val maxErr = keys.indices.map(i => math.abs(rmi.predict(keys(i)) - i)).max
    assert(maxErr < 100, s"maxErr=$maxErr") // uniform increments ≈ linear
  }

  test("duplicate keys (paper §5.1) keep errors local") {
    // 10 groups of 10 identical keys: best possible error within a group is ≤ group size.
    val keys = Array.tabulate(100)(i => (i / 10).toDouble)
    val rmi = SimplifiedRMI.fit(keys, 4)
    val errs = keys.indices.map(i => math.abs(rmi.predict(keys(i)) - i))
    assert(errs.max <= 15, s"errs.max=${errs.max}")
  }

  test("width 1 degenerates to a single linear model") {
    val keys = Array.tabulate(30)(i => i * 3.0)
    val rmi = SimplifiedRMI.fit(keys, 1)
    assert(rmi.leaves.length == 1)
    keys.indices.foreach(i => assert(rmi.predict(keys(i)) == i.toLong))
  }

  test("unreached leaves inherit the root model") {
    // All keys identical → root predicts a constant → only one leaf reached.
    val keys = Array.fill(20)(5.0)
    val rmi = SimplifiedRMI.fit(keys, 4)
    assert(rmi.leaves.length == 4)
    val p = rmi.predict(5.0)
    assert(p >= 0 && p <= 19)
  }

  test("single key trains and predicts") {
    val rmi = SimplifiedRMI.fit(Array(42.0), 3)
    assert(rmi.predict(42.0) == 0L)
  }

  test("empty keys rejected") {
    intercept[IllegalArgumentException](SimplifiedRMI.fit(Array.empty[Double], 2))
  }

  test("routing is stable: same key always reaches the same leaf") {
    val keys = Array.tabulate(100)(i => math.pow(i.toDouble, 1.3))
    val rmi = SimplifiedRMI.fit(keys, 5)
    keys.foreach(k => assert(rmi.predict(k) == rmi.predict(k)))
  }
}
