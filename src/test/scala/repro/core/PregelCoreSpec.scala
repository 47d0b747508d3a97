package repro.core

import repro.SparkSpec
import repro.synth.GraphGen
import repro.testutil.TestGraphs

class PregelCoreSpec extends SparkSpec {
  import spark.implicits._

  test("GraphX h-index iteration matches peeling on the Figure 3 toy graph") {
    val got = PregelCore.coreNumbers(spark, GraphGen.figure3Toy(spark)).collect()
      .map(r => (r.getLong(0).toInt, r.getInt(1))).sortBy(_._1).map(_._2).toSeq
    assert(got == Seq(1, 2, 2, 2, 1, 1))
  }

  test("GraphX h-index iteration matches peeling on random graphs") {
    for (seed <- 1 to 3) {
      val pairs = TestGraphs.randomGraph(25, 0.25, seed)
      val df = pairs.map { case (u, v) => (u.toLong, v.toLong) }.toSeq.toDF("u", "v")
      val h = TestGraphs.hypergraph(pairs, 1, 2)
      val exp = Peeling.decompose(h)
      val got = PregelCore.coreNumbers(spark, df).collect()
        .map(r => (r.getLong(0).toInt, r.getInt(1))).toMap
      // Vertices with no edges never enter GraphX; every edge endpoint must match.
      for ((v, k) <- got) assert(k == exp(v), s"vertex $v seed=$seed")
      val touched = pairs.flatMap(e => Seq(e._1, e._2)).toSet
      assert(got.keySet == touched)
    }
  }

  test("K_n core numbers are n-1 via GraphX") {
    val got = PregelCore.coreNumbers(spark, GraphGen.complete(spark, 6)).collect()
      .map(_.getInt(1))
    assert(got.length == 6 && got.forall(_ == 5))
  }
}
