package repro.jobs

/** One entrypoint for all tables: `spark-submit --class repro.jobs.GenTables
  * repro.jar [3|5|6|8]...` — no args regenerates everything.
  */
object GenTables {
  def main(args: Array[String]): Unit = {
    val which = if (args.isEmpty) Seq("3", "5", "6", "8") else args.toSeq
    which.foreach {
      case "3" => TableIII.main(Array.empty)
      case "5" => TableV.main(Array.empty)
      case "6" => TableVI.main(Array.empty)
      case "8" => TableVIII.main(Array.empty)
      case other => Console.err.println(s"unknown table $other (use 3, 5, 6, 8)")
    }
  }
}
