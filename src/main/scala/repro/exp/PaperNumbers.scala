package repro.exp

/** The numbers the paper reports, kept next to our measurements so
  * EXPERIMENTS.md and the bench output can diff them (values transcribed
  * from Tables 4–11 of the paper).
  */
object PaperNumbers {

  val QualityMethods: Seq[String] = Seq(
    "PPRviz", "OpenOrd/FR", "LinLog", "ForceAtlas", "CMDS", "PMDS",
    "GFactor", "SDNE", "LapEig", "LLE", "Node2vec", "SimRank")

  val SmallGraphs: Seq[String] =
    Seq("TwEgo", "FbEgo", "Wiki-ii", "Physician", "FilmTrust", "SciNet")

  /** Table 4 — ND ("inf" = ∞). */
  val T4_ND: Map[String, Seq[String]] = Map(
    "TwEgo"     -> Seq("2.1E+02", "1.2E+02", "1.1E+03", "1.8E+03", "1.2E+03", "inf", "3.1E+08", "inf", "inf", "4.6E+02", "1.1E+04", "5.2E+02"),
    "FbEgo"     -> Seq("2.4E+03", "1.1E+03", "9.5E+03", "1.3E+04", "2.0E+04", "inf", "3.6E+12", "inf", "inf", "3.9E+07", "1.2E+05", "6.2E+03"),
    "Wiki-ii"   -> Seq("2.7E+04", "2.7E+04", "1.4E+05", "8.1E+04", "4.9E+04", "inf", "9.2E+11", "inf", "inf", "7.5E+29", "2.5E+06", "2.7E+04"),
    "Physician" -> Seq("6.7E+04", "8.7E+04", "7.6E+05", "8.2E+05", "1.5E+05", "inf", "2.5E+10", "inf", "inf", "4.0E+09", "9.4E+07", "1.1E+05"),
    "FilmTrust" -> Seq("9.1E+05", "7.1E+06", "3.2E+08", "1.4E+07", "inf",     "inf", "1.2E+17", "inf", "inf", "1.4E+10", "9.6E+07", "2.9E+06"),
    "SciNet"    -> Seq("2.0E+06", "6.5E+12", "2.3E+09", "1.9E+08", "9.9E+12", "inf", "1.1E+17", "inf", "inf", "inf",     "6.6E+07", "2.2E+06"),
  )

  /** Table 5 — ULCV ("-" = undefined). */
  val T5_ULCV: Map[String, Seq[String]] = Map(
    "TwEgo"     -> Seq("0.22", "0.35", "0.57", "0.37", "0.40", "0.23", "0.45", "1.96", "1.15", "0.46", "0.80", "0.84"),
    "FbEgo"     -> Seq("0.39", "0.42", "0.67", "0.49", "0.46", "0.45", "0.91", "0.94", "0.98", "0.77", "0.96", "0.75"),
    "Wiki-ii"   -> Seq("0.35", "0.41", "1.09", "0.64", "0.62", "0.78", "0.62", "0.94", "1.04", "1.27", "0.86", "0.53"),
    "Physician" -> Seq("0.45", "0.53", "0.90", "0.55", "0.80", "0.47", "0.95", "1.67", "1.02", "0.77", "1.41", "0.53"),
    "FilmTrust" -> Seq("0.48", "0.54", "1.99", "0.96", "1.05", "0.69", "0.64", "1.31", "1.70", "0.87", "0.89", "1.78"),
    "SciNet"    -> Seq("0.34", "0.77", "4.70", "1.52", "1.74", "0.74", "0.86", "1.72", "1.26", "-",    "1.32", "1.98"),
  )

  /** Table 11 (Appendix A.5) — AR. */
  val T11_AR: Map[String, Seq[String]] = Map(
    "TwEgo"     -> Seq("0.00E+00", "1.95E+00", "1.21E+00", "9.26E-03", "0.00E+00", "5.00E+00", "1.40E+01", "6.00E+01", "2.51E+01", "3.87E+00", "1.27E+01", "3.45E+00"),
    "FbEgo"     -> Seq("4.09E+01", "5.60E+01", "6.83E+01", "4.54E+01", "4.54E+01", "9.81E+01", "2.71E+02", "9.58E+02", "6.44E+02", "7.41E+02", "2.97E+02", "6.43E+01"),
    "Wiki-ii"   -> Seq("4.08E+02", "4.01E+02", "4.70E+02", "5.20E+02", "5.14E+02", "3.15E+03", "6.14E+02", "2.81E+03", "2.70E+03", "2.25E+03", "1.01E+03", "1.46E+03"),
    "Physician" -> Seq("4.60E+02", "8.87E+02", "4.34E+02", "3.87E+02", "4.19E+02", "5.83E+02", "1.38E+03", "6.69E+03", "4.74E+03", "5.34E+03", "2.40E+03", "7.82E+02"),
    "FilmTrust" -> Seq("6.72E+02", "8.03E+02", "7.89E+02", "8.09E+02", "1.15E+03", "2.02E+03", "1.51E+03", "8.80E+03", "6.63E+03", "3.73E+03", "3.44E+03", "1.02E+03"),
    "SciNet"    -> Seq("7.51E+02", "1.41E+03", "1.57E+03", "1.29E+03", "1.20E+03", "7.52E+03", "3.60E+03", "1.14E+04", "1.00E+04", "-",        "5.17E+03", "1.10E+03"),
  )

  /** Table 6 — user study T3 selection frequencies out of 180. */
  val T6: Map[String, Int] = Map("Tau-Push" -> 54, "PI" -> 43, "No difference" -> 83)

  /** Table 7 — PPRviz on Twitter, time (s) by k. */
  val T7_K: Seq[Int] = Seq(5, 10, 25, 50, 100)
  val T7_Preprocessing: Seq[Double] = Seq(2267.65, 2114.39, 1934.48, 1842.45, 1796.87)
  val T7_Response: Seq[Double]      = Seq(0.28, 0.43, 0.63, 1.56, 2.10)

  val VariantNames: Seq[String] =
    Seq("PI", "FORA", "FORA+", "ResAcc", "Tau-Push", "GFRA", "GFP(tmax)")

  val LargeGraphs: Seq[String] = Seq("Youtube", "Orkut", "It-2004", "Twitter")

  /** Table 8 — response time (s) of PPRviz variants ("-" = > 1000 s). */
  val T8_Response: Map[String, Seq[String]] = Map(
    "Youtube" -> Seq("-", "-", "-", "-", "0.06", "0.07", "0.06"),
    "Orkut"   -> Seq("-", "-", "-", "-", "0.12", "0.36", "0.12"),
    "It-2004" -> Seq("-", "-", "-", "-", "0.32", "0.73", "0.33"),
    "Twitter" -> Seq("-", "-", "-", "-", "0.63", "2.76", "0.66"),
  )

  /** Table 9 — preprocessing time (s) of PPRviz variants. */
  val T9_Preprocessing: Map[String, Seq[Double]] = Map(
    "Youtube" -> Seq(2.46, 3.35, 3.17, 2.46, 4.04, 5.1, 3.99),
    "Orkut"   -> Seq(72.61, 79.89, 78.75, 72.61, 94.56, 104.94, 94.53),
    "It-2004" -> Seq(169.27, 223.99, 200.21, 169.27, 312.33, 308.3, 69.18),
    "Twitter" -> Seq(1296.17, 1364.04, 1360.08, 1296.17, 1984.73, 1485.64, 1914.92),
  )

  /** Table 10 — index size (MiB) of PPRviz variants. */
  val T10_IndexMiB: Map[String, Seq[Int]] = Map(
    "Youtube" -> Seq(5, 51, 30, 5, 9, 51, 9),
    "Orkut"   -> Seq(13, 237, 95, 13, 25, 237, 25),
    "It-2004" -> Seq(172, 1520, 1022, 172, 330, 1520, 330),
    "Twitter" -> Seq(177, 1610, 1052, 177, 338, 1610, 335),
  )
}
