package repro.bench

import java.nio.file.{Files, Paths}

/** Shared plumbing for the table benches: results are printed to stdout
  * and archived under bench/results/ so EXPERIMENTS.md can diff paper
  * numbers against the latest run.
  */
trait BenchSupport {
  private val resultsDir = Paths.get(sys.props.getOrElse("repro.bench.results", "bench/results"))

  def record(name: String, rendered: String): Unit = {
    Files.createDirectories(resultsDir)
    Files.write(resultsDir.resolve(name), rendered.getBytes("UTF-8"))
    println(rendered)
  }
}
