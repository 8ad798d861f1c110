package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing Table V (FE execution time). */
object TableV {
  def main(args: Array[String]): Unit = {
    Tables.tableV(println)
    ()
  }
}
