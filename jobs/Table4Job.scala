package repro.jobs

import java.nio.file.{Files, Paths}
import repro.experiments.Table4Experiment

/** spark-submit entrypoint regenerating Table 4 (key re-scaling ablation).
  * Usage: `--class repro.jobs.Table4Job repro.jar [outFile]`.
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("table4_results.txt")
    val rendered = Table4Experiment.run().render
    println(rendered)
    Files.write(Paths.get(out), rendered.getBytes("UTF-8"))
  }
}
