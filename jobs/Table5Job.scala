package repro.jobs

import java.nio.file.{Files, Paths}
import repro.experiments.Table5Experiment

/** spark-submit entrypoint regenerating Table 5 (construction time and
  * index memory vs SK-LSH). Usage:
  * `--class repro.jobs.Table5Job repro.jar [outFile]`.
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("table5_results.txt")
    val rendered = Table5Experiment.run().render
    println(rendered)
    Files.write(Paths.get(out), rendered.getBytes("UTF-8"))
  }
}
