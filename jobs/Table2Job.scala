package repro.jobs

import java.nio.file.{Files, Paths}
import repro.experiments.Table2Experiment

/** spark-submit entrypoint regenerating Table 2 (and the Figure 4 AQT
  * companion). Usage:
  *
  *   spark-submit --class repro.jobs.Table2Job repro.jar [outFile]
  *
  * The experiment itself is driver-side (the paper's indexes are
  * in-memory, single-machine); Spark is used by the DSv2 jobs
  * (BuildIndexJob / SearchJob) and the test oracle.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("table2_results.txt")
    val result = Table2Experiment.run()
    val rendered = result.render
    println(rendered)
    Files.write(Paths.get(out), rendered.getBytes("UTF-8"))
    Console.err.println(s"[table2] written to $out")
  }
}
