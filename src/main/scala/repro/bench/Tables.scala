package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import org.apache.spark.sql.SparkSession

/** Runners that regenerate the evaluation tables. Each produces measured
  * rows, prints paper-vs-measured, and appends a markdown artifact under
  * `bench_results/`.
  */
object Tables {

  /** Table X side-by-side: paper dataset sizes vs our substitutes. */
  def tableX(): String = {
    val sb = new StringBuilder("\nTABLE X — datasets (paper vs substitutes)\n")
    Datasets.all.zip(PaperNumbers.tableX).foreach { case (d, (pn, n, e)) =>
      sb ++= f"${d.name}%-22s nodes=${d.nNodes}%7d edges=${d.nEdges}%8d   (paper $pn: $n%9d / $e%10d)\n"
    }
    sb.toString
  }

  /** Tables XI + XII: per-dataset timings and derived reductions.
    *
    * @param reps scenarios averaged per dataset (paper: 125 combinations)
    */
  def tableXI(spark: SparkSession, reps: Int, verify: Boolean): (Seq[(String, MethodTimes)], String) = {
    val rows = Datasets.all.map { spec =>
      val pg = Harness.prepareGraph(spark, spec)
      val times = (0 until reps).map { r =>
        val prep = Harness.preparePattern(spark, pg, patternNodes = 6 + (r % 5),
                                          patternSeed = spec.seed * 100 + r)
        val w = Harness.drawWorkload(prep, nDataUps = 8, seed = spec.seed * 1000 + r)
        Harness.runScenario(spark, prep, w, verify = verify && r == 0)
      }.reduce(_ + _) / reps
      pg.release()
      println(f"[TableXI] ${spec.name}%-22s ua=${times.ua}%.2fs noPar=${times.noPar}%.2fs eh=${times.eh}%.2fs inc=${times.inc}%.2fs")
      spec.name -> times
    }
    val report = tableX() +
      Harness.timingTable("TABLE XI — avg SQuery time per dataset (ours, paper in parens)",
        rows.zip(PaperNumbers.tableXI).map { case ((n, t), p) => (n, t, p) }) +
      Harness.percentTable("TABLE XII — reductions per dataset",
        rows.zip(PaperNumbers.tableXII).map { case ((n, t), p) => (n, t, p) })
    (rows, report)
  }

  /** Tables XIII + XIV: ΔG-scale sweep on the mid dataset.
    * Scale (p, u) = pattern nodes p, |ΔG_D| u — the paper's (6,200)…(10,1000)
    * scaled down to (6,4)…(10,20) (DESIGN.md §3.5).
    */
  val scales: Seq[(Int, Int)] = Seq((6, 4), (7, 8), (8, 12), (9, 16), (10, 20))

  def tableXIII(spark: SparkSession, reps: Int, verify: Boolean): (Seq[(String, MethodTimes)], String) = {
    val spec = Datasets.mid
    val pg   = Harness.prepareGraph(spark, spec)
    val rows = scales.map { case (pn, nUps) =>
      val label = s"($pn, $nUps)"
      val times = (0 until reps).map { r =>
        val prep = Harness.preparePattern(spark, pg, patternNodes = pn,
                                          patternSeed = 7000 + pn * 10 + r)
        val w = Harness.drawWorkload(prep, nDataUps = nUps, seed = 9000 + pn * 100 + r)
        Harness.runScenario(spark, prep, w, verify = verify && r == 0)
      }.reduce(_ + _) / reps
      println(f"[TableXIII] $label%-10s ua=${times.ua}%.2fs noPar=${times.noPar}%.2fs eh=${times.eh}%.2fs inc=${times.inc}%.2fs")
      label -> times
    }
    pg.release()
    val report =
      Harness.timingTable(s"TABLE XIII — avg SQuery time per ΔG scale on ${spec.name} (paper scales 200..1000 → ours 4..20)",
        rows.zip(PaperNumbers.tableXIII).map { case ((n, t), p) => (n, t, p) }) +
      Harness.percentTable("TABLE XIV — reductions per ΔG scale",
        rows.zip(PaperNumbers.tableXIV).map { case ((n, t), p) => (n, t, p) })
    (rows, report)
  }

  /** Append a report to `bench_results/<file>` (created if missing). */
  def saveReport(file: String, report: String): Unit = {
    val dir = Paths.get("bench_results")
    if (!Files.exists(dir)) Files.createDirectories(dir)
    Files.write(dir.resolve(file), report.getBytes("UTF-8"),
                StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
