package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.{Table4Experiment, Table4Result}

/** Regenerates Table 4 (key re-scaling ablation on MS-100k) and asserts
  * the paper's shape: without re-scaling, out-of-range predictions
  * dominate and almost fully overlap the large errors; with re-scaling,
  * OOR all but vanishes and large errors drop, with zero overlap.
  */
class Table4Bench extends AnyFunSuite with BenchSupport {

  private lazy val result: Table4Result = {
    val r = Table4Experiment.run()
    record("table4.txt", r.render)
    r
  }

  test("without re-scaling, most predictions are out of range") {
    val no = result.row(rescaled = false)
    assert(no.nOor > result.queries / 2, s"oor=${no.nOor} of ${result.queries}")
  }

  test("without re-scaling, OOR and LE overlap heavily (OOR causes the large errors)") {
    val no = result.row(rescaled = false)
    assert(no.nOverlap >= (no.nOor * 7) / 10, s"overlap=${no.nOverlap} oor=${no.nOor}")
    assert(no.nLe >= no.nOverlap)
  }

  test("with re-scaling, OOR all but vanishes") {
    val no = result.row(rescaled = false)
    val yes = result.row(rescaled = true)
    assert(yes.nOor <= math.max(1, no.nOor / 10), s"yes.oor=${yes.nOor} no.oor=${no.nOor}")
  }

  test("with re-scaling, large errors drop and the overlap empties out") {
    val no = result.row(rescaled = false)
    val yes = result.row(rescaled = true)
    assert(yes.nLe <= no.nLe, s"le: ${no.nLe} → ${yes.nLe}")
    assert(yes.nOverlap <= yes.nOor)
  }
}
