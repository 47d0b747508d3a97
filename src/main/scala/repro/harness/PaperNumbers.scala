package repro.harness

/** The paper's published evaluation numbers (Tables 3–5), keyed by the
  * graph abbreviations of Table 3, so every harness can print
  * paper-vs-measured rows and EXPERIMENTS.md can diff shapes directly.
  */
object PaperNumbers {

  /** Table 3: |V|, |E|, |triangles|, |K4| of the original graphs. */
  final case class Stats(v: Double, e: Double, tri: Double, k4: Double)
  val table3: Map[String, Stats] = Map(
    "ASK"  -> Stats(1.7e6, 11.1e6, 28.8e6, 148.8e6),
    "FB"   -> Stats(4e3, 88.2e3, 1.6e6, 30.0e6),
    "SLJ"  -> Stats(4.8e6, 68.5e6, 285.7e6, 9.9e9),
    "ORK"  -> Stats(2.9e6, 106.3e6, 524.6e6, 2.4e9),
    "SSE"  -> Stats(131.8e3, 711.2e3, 4.9e6, 58.6e6),
    "HG"   -> Stats(456.6e3, 12.5e6, 83.0e6, 429.7e6),
    "TW"   -> Stats(81.3e3, 1.3e6, 13.1e6, 104.9e6),
    "WGO"  -> Stats(916.4e3, 4.3e6, 13.4e6, 39.9e6),
    "WND"  -> Stats(325.7e3, 1.1e6, 8.9e6, 231.9e6),
    "WIKI" -> Stats(3.1e6, 37.0e6, 88.8e6, 162.9e6),
  )

  /** Table 4: (degree levels, SND iterations, AND iterations). */
  final case class Iters(levels: Int, snd: Int, and: Int)
  val table4: Map[(String, String), Iters] = Map(
    ("k-core", "ASK") -> Iters(1195, 63, 33),   ("k-core", "FB") -> Iters(352, 21, 11),
    ("k-core", "SLJ") -> Iters(3479, 99, 51),   ("k-core", "ORK") -> Iters(5165, 147, 73),
    ("k-core", "SSE") -> Iters(642, 38, 19),    ("k-core", "HG") -> Iters(1713, 73, 37),
    ("k-core", "TW") -> Iters(961, 37, 21),     ("k-core", "WGO") -> Iters(384, 23, 14),
    ("k-core", "WND") -> Iters(665, 187, 35),   ("k-core", "WIKI") -> Iters(2026, 55, 30),
    ("k-truss", "ASK") -> Iters(1605, 118, 58), ("k-truss", "FB") -> Iters(859, 33, 19),
    ("k-truss", "SLJ") -> Iters(5401, 86, 44),  ("k-truss", "ORK") -> Iters(4031, 207, 103),
    ("k-truss", "SSE") -> Iters(1273, 52, 28),  ("k-truss", "HG") -> Iters(2215, 101, 53),
    ("k-truss", "TW") -> Iters(1337, 52, 29),   ("k-truss", "WGO") -> Iters(254, 20, 11),
    ("k-truss", "WND") -> Iters(417, 187, 15),  ("k-truss", "WIKI") -> Iters(2824, 562, 410),
    ("(3,4)", "ASK") -> Iters(1734, 72, 41),    ("(3,4)", "FB") -> Iters(1171, 38, 23),
    ("(3,4)", "SLJ") -> Iters(7426, 123, 73),   ("(3,4)", "ORK") -> Iters(3757, 196, 116),
    ("(3,4)", "SSE") -> Iters(1584, 54, 30),    ("(3,4)", "HG") -> Iters(2360, 109, 51),
    ("(3,4)", "TW") -> Iters(1641, 76, 40),     ("(3,4)", "WGO") -> Iters(157, 11, 6),
    ("(3,4)", "WND") -> Iters(138, 14, 10),     ("(3,4)", "WIKI") -> Iters(1559, 122, 107),
  )

  /** Table 5: (peeling seconds, AND seconds, speedup) with 24 threads. */
  final case class Runtime(peelingSec: Double, andSec: Double, speedup: Double)
  val table5: Map[(String, String), Runtime] = Map(
    ("k-core", "ASK") -> Runtime(0.61, 1.04, 0.59),   ("k-core", "FB") -> Runtime(0.002, 0.008, 0.21),
    ("k-core", "SLJ") -> Runtime(4.35, 7.45, 0.58),   ("k-core", "ORK") -> Runtime(11.46, 19.90, 0.58),
    ("k-core", "SSE") -> Runtime(0.02, 0.10, 0.25),   ("k-core", "HG") -> Runtime(0.70, 1.10, 0.64),
    ("k-core", "TW") -> Runtime(0.04, 0.07, 0.50),    ("k-core", "WGO") -> Runtime(0.36, 0.36, 0.99),
    ("k-core", "WND") -> Runtime(0.02, 0.11, 0.21),   ("k-core", "WIKI") -> Runtime(3.84, 9.36, 0.41),
    ("k-truss", "ASK") -> Runtime(55.9, 13.8, 4.04),  ("k-truss", "FB") -> Runtime(0.533, 0.6, 0.84),
    ("k-truss", "SLJ") -> Runtime(192.7, 104.6, 1.84),("k-truss", "ORK") -> Runtime(746.7, 359.1, 2.08),
    ("k-truss", "SSE") -> Runtime(3.1, 2.5, 1.24),    ("k-truss", "HG") -> Runtime(158.1, 73.0, 2.17),
    ("k-truss", "TW") -> Runtime(5.3, 4.6, 1.15),     ("k-truss", "WGO") -> Runtime(7.2, 2.8, 2.61),
    ("k-truss", "WND") -> Runtime(3.0, 0.9, 3.41),    ("k-truss", "WIKI") -> Runtime(378.3, 96.5, 3.92),
    ("(3,4)", "ASK") -> Runtime(457, 167, 2.73),      ("(3,4)", "FB") -> Runtime(36, 21, 1.70),
    ("(3,4)", "SLJ") -> Runtime(25111, 11651, 2.16),  ("(3,4)", "ORK") -> Runtime(6781, 2977, 2.28),
    ("(3,4)", "SSE") -> Runtime(103, 59, 1.76),       ("(3,4)", "HG") -> Runtime(2047, 875, 2.34),
    ("(3,4)", "TW") -> Runtime(131, 73, 1.79),        ("(3,4)", "WGO") -> Runtime(45, 14, 3.28),
    ("(3,4)", "WND") -> Runtime(261, 33, 7.98),       ("(3,4)", "WIKI") -> Runtime(3034, 820, 3.70),
  )

  /** Proxy-name ("ask-x") to paper abbreviation ("ASK"). */
  def abbrev(proxyName: String): String = proxyName.stripSuffix("-x").toUpperCase
}
