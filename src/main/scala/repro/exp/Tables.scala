package repro.exp

/** The paper's reported numbers, kept next to ours for EXPERIMENTS.md
  * parity, plus row-formatting helpers shared by jobs/ and bench/.
  */
object Tables {

  /** Table 2 (paper): pairwise (Ss=2) vs in-context clustering (Ss=9). */
  val table2Paper: Map[(String, String), (Double, Double, Double, Double, Double, Double)] =
    // (dataset, mode) -> (ACC, FP, cost USD, tokens M, time min, api calls K)
    Map(
      ("Cora", "pairwise")     -> (0.88, 0.67, 0.67, 3.45, 297.27, 30.23),
      ("Cora", "clustering")   -> (0.90, 0.71, 0.03, 0.12, 5.42, 0.28),
      ("Alaska", "pairwise")   -> (0.81, 0.78, 0.43, 2.29, 241.31, 24.54),
      ("Alaska", "clustering") -> (0.82, 0.79, 0.15, 0.73, 39.57, 2.04),
      ("AS", "pairwise")       -> (0.70, 0.60, 0.08, 0.35, 77.2, 7.85),
      ("AS", "clustering")     -> (0.70, 0.63, 0.02, 0.07, 8.01, 0.41),
    )

  /** Table 3 (paper): record sets per hierarchy level. */
  val table3Paper: Map[String, Vector[Int]] = Map(
    "Cora"   -> Vector(183, 76, 15, 5),
    "Alaska" -> Vector(1312, 604, 101, 20, 5, 1),
    "AS"     -> Vector(251, 107, 48, 6, 1),
  )

  /** Table 4 (paper): end-to-end ACC / FP / cost / tokens / time(s) / calls. */
  val table4Paper: Map[(String, String), (Double, Double, Double, Double, Double, Int)] = Map(
    ("Alaska", "LLM-CER") -> (0.82, 0.79, 0.15, 0.73, 2374.2, 2043),
    ("Alaska", "Booster") -> (0.71, 0.55, 0.02, 0.19, 2450.1, 2606),
    ("Alaska", "BQ")      -> (0.33, 0.49, 1.55, 5.59, 8798.9, 8035),
    ("Alaska", "CrowdER") -> (0.68, 0.62, 0.42, 2.04, 6547.2, 5845),
    ("AS", "LLM-CER")     -> (0.70, 0.63, 0.02, 0.07, 480.6, 413),
    ("AS", "Booster")     -> (0.62, 0.62, 0.01, 0.03, 622.9, 723),
    ("AS", "BQ")          -> (0.54, 0.51, 0.29, 0.34, 925.5, 842),
    ("AS", "CrowdER")     -> (0.52, 0.50, 0.11, 0.37, 2356.2, 2084),
    ("Song", "LLM-CER")   -> (0.72, 0.78, 0.06, 0.22, 933.2, 668),
    ("Song", "Booster")   -> (0.52, 0.68, 0.02, 0.11, 903.3, 921),
    ("Song", "BQ")        -> (0.59, 0.67, 0.77, 1.98, 2581.5, 2338),
    ("Song", "CrowdER")   -> (0.52, 0.64, 0.12, 0.43, 1856.3, 1247),
    ("Music", "LLM-CER")  -> (0.71, 0.61, 0.19, 0.90, 2388.4, 3859),
    ("Music", "Booster")  -> (0.59, 0.60, 0.02, 0.15, 2585.1, 3915),
    ("Music", "BQ")       -> (0.60, 0.54, 2.18, 8.96, 17515.8, 17365),
    ("Music", "CrowdER")  -> (0.62, 0.55, 0.39, 1.82, 4562.3, 7782),
    ("DG", "LLM-CER")     -> (0.81, 0.70, 0.07, 0.37, 1552.4, 1285),
    ("DG", "Booster")     -> (0.56, 0.68, 0.02, 0.18, 2552.2, 3085),
    ("DG", "BQ")          -> (0.62, 0.63, 1.12, 3.92, 6052.2, 6456),
    ("DG", "CrowdER")     -> (0.72, 0.65, 0.34, 1.79, 7456.3, 6504),
    ("Cora", "LLM-CER")   -> (0.90, 0.71, 0.03, 0.12, 325.5, 279),
    ("Cora", "Booster")   -> (0.75, 0.60, 0.01, 0.06, 605.4, 698),
    ("Cora", "BQ")        -> (0.62, 0.56, 1.45, 4.23, 4085.3, 4882),
    ("Cora", "CrowdER")   -> (0.51, 0.61, 0.07, 0.29, 598.5, 483),
    ("Citeseer", "LLM-CER") -> (0.88, 0.95, 0.03, 0.13, 1360.8, 1302),
    ("Citeseer", "Booster") -> (0.72, 0.78, 0.01, 0.05, 1585.2, 2169),
    ("Citeseer", "BQ")      -> (0.64, 0.79, 0.63, 1.64, 6228.9, 6420),
    ("Citeseer", "CrowdER") -> (0.60, 0.69, 0.08, 0.37, 3895.6, 3858),
    ("AG", "LLM-CER")     -> (0.71, 0.64, 0.02, 0.07, 465.6, 452),
    ("AG", "Booster")     -> (0.58, 0.55, 0.01, 0.03, 785.2, 998),
    ("AG", "BQ")          -> (0.53, 0.50, 0.62, 0.86, 1658.2, 1895),
    ("AG", "CrowdER")     -> (0.50, 0.48, 0.09, 0.42, 1985.2, 2025),
    ("WA", "LLM-CER")     -> (0.61, 0.56, 0.02, 0.06, 375.8, 398),
    ("WA", "Booster")     -> (0.50, 0.48, 0.01, 0.03, 475.2, 825),
    ("WA", "BQ")          -> (0.42, 0.41, 0.59, 0.68, 1498.5, 1585),
    ("WA", "CrowdER")     -> (0.51, 0.50, 0.08, 0.39, 3895.6, 1958),
  )

  /** Table 5 (paper): optimal (Ss, Sd) per attribute configuration. */
  val table5Paper: Map[String, (Int, Int)] = Map(
    "Cora-A4"  -> (9, 3), "Cora-A8" -> (9, 4), "Cora-A12" -> (9, 4),
    "Alaska-A3" -> (9, 4), "Alaska-A6" -> (9, 4), "Alaska-A9" -> (9, 4),
    "WA-full"  -> (7, 3), "WA-noT" -> (12, 4), "WA-noC" -> (8, 3), "WA-noN" -> (8, 4),
    "Citeseer-full" -> (9, 4), "Citeseer-noT" -> (8, 4),
    "Citeseer-noC" -> (9, 4), "Citeseer-noN" -> (9, 4),
  )

  /** Table 6 (paper): end-to-end vs attribute count (ACC, FP). */
  val table6Paper: Map[(String, Int), (Double, Double)] = Map(
    ("Cora", 4) -> (0.82, 0.66), ("Cora", 8) -> (0.85, 0.67), ("Cora", 12) -> (0.90, 0.71),
    ("Alaska", 3) -> (0.74, 0.74), ("Alaska", 6) -> (0.77, 0.75), ("Alaska", 9) -> (0.82, 0.79),
  )

  /** Table 7 (paper): end-to-end vs attribute types (ACC, FP). */
  val table7Paper: Map[(String, String), (Double, Double)] = Map(
    ("WA", "full") -> (0.61, 0.56), ("WA", "noT") -> (0.72, 0.66),
    ("WA", "noN") -> (0.66, 0.58), ("WA", "noC") -> (0.60, 0.54),
    ("Citeseer", "full") -> (0.88, 0.95), ("Citeseer", "noT") -> (0.82, 0.90),
    ("Citeseer", "noN") -> (0.86, 0.92), ("Citeseer", "noC") -> (0.86, 0.93),
  )

  /** Table 8 (paper): MDG ablation (ACC, FP) w/o and w/ MDG. */
  val table8Paper: Map[String, ((Double, Double), (Double, Double))] = Map(
    "Cora"   -> ((0.60, 0.58), (0.90, 0.71)),
    "Alaska" -> ((0.35, 0.47), (0.82, 0.79)),
    "AS"     -> ((0.52, 0.52), (0.70, 0.63)),
  )

  def fmtRow(label: String, paper: String, ours: String): String =
    f"$label%-28s paper: $paper%-44s ours: $ours"
}
