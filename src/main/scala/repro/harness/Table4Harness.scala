package repro.harness

import org.apache.spark.sql.SparkSession
import repro.core.{And, DegreeLevels, Snd}
import repro.synth.Proxies

/** Table 4 — iterations to convergence: the degree-levels upper bound
  * versus measured SND and AND iteration counts, for all three
  * decompositions. Sequential engines, natural r-clique order (as in the
  * paper's §5.1 runs).
  */
object Table4Harness {

  final case class Row(decomp: String, graph: String, abbrev: String,
                       levels: Int, snd: Int, and: Int)

  def run(spark: SparkSession, specs: Seq[Proxies.Spec] = Proxies.all,
          decomps: Seq[Harness.Decomp] = Harness.decomps): Seq[Row] =
    for (d <- decomps; spec <- specs) yield {
      val h = Harness.hypergraph(spark, spec, d)
      Row(d.label, spec.name, PaperNumbers.abbrev(spec.name),
          DegreeLevels.count(h),
          Snd.decompose(h).iterations,
          And.decompose(h).iterations)
    }

  def format(rows: Seq[Row]): String = {
    val header = Seq("decomp", "graph", "levels", "snd", "and",
                     "paper-levels", "paper-snd", "paper-and")
    Harness.table(header, rows.map { r =>
      val p = PaperNumbers.table4((r.decomp, r.abbrev))
      Seq(r.decomp, r.graph, r.levels.toString, r.snd.toString, r.and.toString,
          p.levels.toString, p.snd.toString, p.and.toString)
    })
  }
}
