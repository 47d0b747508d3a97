package repro.harness

import org.apache.spark.sql.SparkSession
import repro.synth.Proxies

/** Table 3 — dataset statistics: |V|, |E|, |triangles|, |K4| for every
  * proxy graph, printed next to the paper's numbers for the original graph.
  */
object Table3Harness {

  final case class Row(name: String, abbrev: String, v: Long, e: Long, tri: Long, k4: Long)

  def run(spark: SparkSession, specs: Seq[Proxies.Spec] = Proxies.all): Seq[Row] =
    specs.map { spec =>
      val m = Harness.materialized(spark, spec)
      Row(spec.name, PaperNumbers.abbrev(spec.name),
          m.graph.n.toLong, m.graph.m.toLong, m.numTriangles.toLong, m.numQuads.toLong)
    }

  private def human(x: Double): String =
    if (x >= 1e9) f"${x / 1e9}%.1fB" else if (x >= 1e6) f"${x / 1e6}%.1fM"
    else if (x >= 1e3) f"${x / 1e3}%.1fK" else f"$x%.0f"

  def format(rows: Seq[Row]): String = {
    val header = Seq("graph", "|V|", "|E|", "|tri|", "|K4|",
                     "paper|V|", "paper|E|", "paper|tri|", "paper|K4|")
    Harness.table(header, rows.map { r =>
      val p = PaperNumbers.table3(r.abbrev)
      Seq(r.name, r.v.toString, r.e.toString, r.tri.toString, r.k4.toString,
          human(p.v), human(p.e), human(p.tri), human(p.k4))
    })
  }
}
