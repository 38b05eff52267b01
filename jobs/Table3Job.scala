package repro.jobs

import java.nio.file.{Files, Paths}
import repro.experiments.Table3Experiment

/** spark-submit entrypoint regenerating Table 3 (H sweep on a standalone
  * core model). Usage: `--class repro.jobs.Table3Job repro.jar [outFile]`.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("table3_results.txt")
    val rendered = Table3Experiment.run().render
    println(rendered)
    Files.write(Paths.get(out), rendered.getBytes("UTF-8"))
  }
}
