package repro.tools

import org.apache.spark.sql.SparkSession
import repro.cliques.{FourCliques, Triangles}
import repro.graph.GraphOps
import repro.synth.GraphGen

/** Scratch calibration utility: prints |V|,|E|,|tri|,|K4| for candidate
  * proxy parameters so DESIGN.md's table can be tuned to mimic the paper's
  * clique-density ratios at laptop scale. Not part of the evaluation.
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("calibrate")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val cands = Seq(
      // name, n, m, gamma, planted (count, size)*
      ("A", 12000L, 60000L, 0.66, Seq((60, 12))),
      ("B", 800L, 16000L, 0.45, Seq((30, 12))),
      ("C", 2500L, 35000L, 0.60, Seq((40, 12))),
      ("D", 5000L, 15000L, 0.60, Seq((20, 18))),
      ("E", 16000L, 100000L, 0.68, Seq((80, 12))),
      ("F", 15000L, 130000L, 0.60, Seq((80, 12))),
    )
    for ((name, n, m, g, planted) <- cands) {
      val t0 = System.nanoTime()
      var edges = GraphGen.chungLu(spark, n, m, g, seed = 42)
      for (((c, s), i) <- planted.zipWithIndex)
        edges = GraphGen.withPlantedCliques(spark, edges, n, c, s, seed = 43 + i)
      val canon = GraphOps.relabelByDegree(edges).cache()
      val (v, e) = GraphOps.sizes(canon)
      val tri = Triangles.enumerate(canon).cache()
      val nt = tri.count()
      val nq = FourCliques.enumerate(canon, tri).count()
      val secs = (System.nanoTime() - t0) / 1e9
      println(f"$name n=$n%-6d g=$g%.2f planted=$planted |V|=$v%-6d |E|=$e%-7d |tri|=$nt%-8d |K4|=$nq%-9d (${secs}%.1fs)")
      tri.unpersist(); canon.unpersist()
      // Shape probe: peeling vs 16-thread AND, Table-5 style (on-the-fly
      // engines for truss and (3,4), materialized adjacency for k-core).
      import repro.core.{And, Nucleus34OnTheFly, NucleusBuilder, Peeling, TrussOnTheFly}
      import repro.harness.Harness
      val m2 = NucleusBuilder.materialize(canon)
      val hc = NucleusBuilder.coreHypergraph(m2)
      Peeling.decompose(hc); And.decompose(hc, threads = 16)
      val pc = Harness.timeMs(3)(Peeling.decompose(hc))
      val ac = Harness.timeMs(3)(And.decompose(hc, threads = 16))
      println(f"    core   peel=$pc%8.2fms and16=$ac%8.2fms speedup=${pc / ac}%5.2f")
      val te = new TrussOnTheFly(m2.graph)
      te.peel(16); te.and(16)
      val pt = Harness.timeMs(3)(te.peel(16))
      val at = Harness.timeMs(3)(te.and(16))
      println(f"    truss  peel=$pt%8.2fms and16=$at%8.2fms speedup=${pt / at}%5.2f")
      val ne = new Nucleus34OnTheFly(m2.graph, m2.tri)
      ne.peel(16); ne.and(16)
      val pn = Harness.timeMs(3)(ne.peel(16))
      val an = Harness.timeMs(3)(ne.and(16))
      println(f"    nuc34  peel=$pn%8.2fms and16=$an%8.2fms speedup=${pn / an}%5.2f")
    }
    spark.stop()
  }
}
