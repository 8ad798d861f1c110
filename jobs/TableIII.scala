package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing Table III (+ Table IV header).
  * Usage: spark-submit --class repro.jobs.TableIII repro.jar [repeats]
  */
object TableIII {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(Tables.repeats)
    Tables.tableIV(println)
    println()
    Tables.tableIII(println, nRepeats = n)
    ()
  }
}
