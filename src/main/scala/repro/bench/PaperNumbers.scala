package repro.bench

/** The paper's reported numbers (Tables X–XIV), embedded so every bench
  * prints paper-vs-measured side by side (EXPERIMENTS.md).
  */
object PaperNumbers {

  /** Table X: the five SNAP datasets (name, #nodes, #edges). */
  val tableX: Seq[(String, Long, Long)] = Seq(
    ("email-EU-core", 1005L, 25571L),
    ("DBLP", 317080L, 1049866L),
    ("Amazon", 334863L, 925872L),
    ("Youtube", 1134890L, 2987624L),
    ("LiveJournal", 3997962L, 34681189L),
  )

  /** Table XI: avg query processing time in seconds —
    * (dataset, UA-GPNM, UA-GPNM-NoPar, EH-GPNM, INC-GPNM).
    */
  val tableXI: Seq[(String, Double, Double, Double, Double)] = Seq(
    ("email-EU-core", 3.31, 3.98, 5.25, 8.27),
    ("DBLP", 210.34, 262.71, 322.38, 501.25),
    ("Amazon", 225.48, 278.37, 346.15, 536.85),
    ("Youtube", 497.70, 602.41, 753.03, 1185.23),
    ("LiveJournal", 1567.48, 1911.56, 2449.19, 3765.27),
  )

  /** Table XII: UA-GPNM's reduction vs (INC-GPNM, EH-GPNM, UA-GPNM-NoPar)
    * in percent, per dataset.
    */
  val tableXII: Seq[(String, Double, Double, Double)] = Seq(
    ("email-EU-core", 59.98, 36.95, 16.83),
    ("DBLP", 58.04, 34.75, 19.77),
    ("Amazon", 58.00, 34.86, 18.99),
    ("Youtube", 58.60, 33.91, 14.91),
    ("LiveJournal", 58.37, 36.01, 18.00),
  )

  /** Table XIII: avg query time per ΔG scale —
    * (scale label, UA-GPNM, UA-GPNM-NoPar, EH-GPNM, INC-GPNM).
    */
  val tableXIII: Seq[(String, Double, Double, Double, Double)] = Seq(
    ("(6, 200)", 371.64, 423.46, 503.03, 712.67),
    ("(7, 400)", 439.23, 513.71, 643.29, 956.63),
    ("(8, 600)", 510.02, 606.03, 774.87, 1182.12),
    ("(9, 800)", 571.69, 700.35, 907.19, 1417.40),
    ("(10, 1000)", 636.42, 786.02, 1038.96, 1625.27),
  )

  /** Table XIV: UA-GPNM's reduction vs the other three, per ΔG scale. */
  val tableXIV: Seq[(String, Double, Double, Double)] = Seq(
    ("(6, 200)", 47.85, 26.12, 12.24),
    ("(7, 400)", 54.09, 31.72, 14.50),
    ("(8, 600)", 56.86, 34.18, 15.84),
    ("(9, 800)", 59.67, 36.98, 18.37),
    ("(10, 1000)", 60.84, 38.74, 19.03),
  )
}
