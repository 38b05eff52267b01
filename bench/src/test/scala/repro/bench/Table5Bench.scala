package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.{Table5Experiment, Table5Result}

/** Regenerates Table 5 (construction time + index memory, LIDER vs the
  * original SK-LSH, two largest datasets) and asserts the paper's shape:
  * LIDER's index is dramatically smaller (paper: 53–58% savings), the
  * centroids retriever adds almost nothing, the in-cluster retrievers
  * are the bulk of the size, and clustering dominates construction time.
  */
class Table5Bench extends AnyFunSuite with BenchSupport {

  private lazy val result: Table5Result = {
    val r = Table5Experiment.run()
    record("table5.txt", r.render)
    r
  }

  private val datasets = Seq("MS-8.8M", "Wiki-21M")

  test("LIDER saves a large fraction of SK-LSH's index memory") {
    // Paper: 53% on MS-8.8M (SK-LSH H = 24) and 58% on Wiki-21M — but the
    // paper's Wiki saving leans on shrinking 24-char string hashkeys to
    // ~8 chars per cluster; our keys are bit-packed (18 bits flat-corpus)
    // and SK-LSH already runs H = 14 on Wiki, so less is left to save
    // there. Expect paper-like savings on MS-8.8M, smaller-but-real on
    // Wiki.
    val minSaving = Map("MS-8.8M" -> 0.4, "Wiki-21M" -> 0.15)
    datasets.foreach { d =>
      val c = result.col(d)
      val saving = 1.0 - c.memAfterStage3.toDouble / c.sklshBytes
      assert(saving > minSaving(d),
        f"$d saving=$saving%.2f (lider=${c.memAfterStage3} sklsh=${c.sklshBytes})")
    }
  }

  test("the centroids retriever is a tiny fraction of the index (stage 2 ≈ stage 1 memory)") {
    datasets.foreach { d =>
      val c = result.col(d)
      val crBytes = c.memAfterStage2 - c.memAfterStage1
      assert(crBytes < c.memAfterStage3 / 10, s"$d CR bytes=$crBytes total=${c.memAfterStage3}")
    }
  }

  test("in-cluster retrievers dominate the final index size (stage 3 ≫ stage 2)") {
    datasets.foreach { d =>
      val c = result.col(d)
      assert(c.memAfterStage3 > c.memAfterStage2 * 3, s"$d stage3=${c.memAfterStage3}")
    }
  }

  test("clustering is the construction bottleneck of LIDER (paper §7.6)") {
    datasets.foreach { d =>
      val c = result.col(d)
      assert(c.stage1Millis > c.stage2Millis, s"$d stage1 vs stage2")
      assert(c.stage1Millis > c.stage3Millis * 0.3, s"$d stage1=${c.stage1Millis} stage3=${c.stage3Millis}")
    }
  }

  test("stage times are positive") {
    datasets.foreach { d =>
      val c = result.col(d)
      assert(c.stage1Millis > 0 && c.stage2Millis > 0 && c.stage3Millis > 0 && c.sklshMillis > 0)
    }
  }
}
