package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing Table VI (feature stability).
  * Usage: spark-submit --class repro.jobs.TableVI repro.jar [T]
  */
object TableVI {
  def main(args: Array[String]): Unit = {
    val t = args.headOption.map(_.toInt).getOrElse(Tables.stabilityRuns)
    Tables.tableVI(println, tRuns = t)
    ()
  }
}
