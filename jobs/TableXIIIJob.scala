package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint regenerating Tables XIII and XIV (ΔG-scale sweep).
  *
  * Usage: `spark-submit --class repro.jobs.TableXIIIJob <jar> [reps] [verify]`
  */
object TableXIIIJob {
  def main(args: Array[String]): Unit = {
    val reps   = args.headOption.map(_.toInt).getOrElse(3)
    val verify = args.lift(1).forall(_.toBoolean)
    val spark  = Sessions.local("ua-gpnm-table-xiii")
    try {
      val (_, report) = Tables.tableXIII(spark, reps, verify)
      println(report)
      Tables.saveReport("table_xiii_xiv.md", report)
    } finally spark.stop()
  }
}
