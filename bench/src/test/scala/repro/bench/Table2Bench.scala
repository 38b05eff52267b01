package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.{Table2Experiment, Table2Result}
import repro.retrieval.Scaled

/** Regenerates Table 2 (end-to-end quality) plus the Figure 4 AQT
  * companion, and asserts the paper's qualitative claims (the *shape*,
  * per DESIGN.md §5 — absolute values are not comparable across
  * hardware/scale):
  *
  *  1. Flat is the quality upper bound and the slowest method at scale.
  *  2. Quality falls as the corpus grows (more distractors).
  *  3. LIDER is faster than Flat and than SK-LSH on the largest corpora,
  *     with higher quality than the fastest baseline (IVFPQ-HNSW).
  */
class Table2Bench extends AnyFunSuite with BenchSupport {

  private lazy val result: Table2Result = {
    val r = Table2Experiment.run()
    record("table2.txt", r.render)
    r
  }

  private val largest = Seq("MS-8.8M", "Wiki-21M")

  test("grid is complete and metrics are well-formed") {
    val datasets = Scaled.Datasets.map(_.label)
    for (m <- Scaled.Methods; d <- datasets) {
      val c = result.cell(m, d)
      assert(c.devMrr >= 0.0 && c.devMrr <= 1.0, s"$m/$d mrr=${c.devMrr}")
      assert(c.aqtMillis > 0.0)
      assert(c.trecNdcg.forall(n => n >= 0.0 && n <= 1.0))
      assert(c.trecNdcg.isDefined != d.startsWith("Wiki"), s"$m/$d trec presence")
    }
  }

  test("Flat is the MRR upper bound on every dataset (within noise)") {
    for (d <- Scaled.Datasets.map(_.label); m <- Scaled.Methods if m != "Flat") {
      assert(result.cell(m, d).devMrr <= result.cell("Flat", d).devMrr + 0.02,
        s"$m beat Flat on $d")
    }
  }

  test("quality degrades with corpus scale (paper Table 2 trend)") {
    val flatSmall = result.cell("Flat", "MS-100k").devMrr
    val flatLarge = result.cell("Flat", "MS-8.8M").devMrr
    assert(flatLarge < flatSmall, s"flat: $flatSmall → $flatLarge")
    val liderSmall = result.cell("LIDER", "MS-100k").devMrr
    val liderLarge = result.cell("LIDER", "MS-8.8M").devMrr
    assert(liderLarge < liderSmall, s"lider: $liderSmall → $liderLarge")
  }

  test("Flat is the slowest method on the largest datasets") {
    for (d <- largest; m <- Scaled.Methods if m != "Flat") {
      assert(result.cell(m, d).aqtMillis <= result.cell("Flat", d).aqtMillis * 1.2,
        s"$m slower than Flat on $d")
    }
  }

  test("LIDER is much faster than Flat at scale, with the slowest AQT growth (paper §6 / Fig 4)") {
    // The paper's Fig 4 claims: LIDER's AQT grows slowest with corpus
    // size (near-logarithmic, §6), Flat's fastest. We assert the growth
    // ratios. (The paper additionally shows LIDER beating SK-LSH's
    // *absolute* AQT — that hinges on SK-LSH's 24 string-hashkey arrays
    // over millions of entries being expensive per candidate; our SK-LSH
    // runs on packed 64-bit keys with a k-bound budget and is
    // microsecond-cheap at ×1/100 scale, so that particular gap does not
    // transfer. See EXPERIMENTS.md.)
    for (d <- largest) {
      assert(result.cell("LIDER", d).aqtMillis < result.cell("Flat", d).aqtMillis / 2,
        s"LIDER vs Flat on $d")
    }
    val liderGrowth = result.cell("LIDER", "Wiki-21M").aqtMillis /
      result.cell("LIDER", "MS-100k").aqtMillis
    val flatGrowth = result.cell("Flat", "Wiki-21M").aqtMillis /
      result.cell("Flat", "MS-100k").aqtMillis
    assert(liderGrowth < flatGrowth / 3, s"growth: lider=$liderGrowth flat=$flatGrowth")
  }

  test("LIDER has higher quality than the fastest baseline (IVFPQ-HNSW) at scale") {
    for (d <- largest) {
      assert(result.cell("LIDER", d).devMrr >= result.cell("IVFPQ-HNSW", d).devMrr - 0.02,
        s"LIDER vs IVFPQ-HNSW on $d")
    }
  }

  test("LIDER quality is competitive with the PQ family at scale (paper: beats OPQ/PCA-PQ on largest)") {
    for (d <- largest) {
      val lider = result.cell("LIDER", d).devMrr
      val pcapq = result.cell("PCA-PQ", d).devMrr
      assert(lider >= pcapq - 0.05, s"LIDER=$lider vs PCA-PQ=$pcapq on $d")
    }
  }
}
