package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.testutil.TestGraphs

class PeelingSpec extends AnyFunSuite {

  test("empty hypergraph") {
    assert(Peeling.decompose(Hypergraph.fromSeqs(0, 2, Seq.empty)).isEmpty)
  }

  test("isolated r-cliques get kappa 0") {
    val h = Hypergraph.fromSeqs(3, 2, Seq(Seq(0, 1)))
    assert(Peeling.decompose(h).toSeq == Seq(1, 1, 0))
  }

  test("K_n core numbers are n-1") {
    for (n <- 2 to 8) {
      val h = TestGraphs.hypergraph(TestGraphs.complete(n), 1, 2)
      assert(Peeling.decompose(h).forall(_ == n - 1), s"K$n")
    }
  }

  test("K_n truss numbers are n-2") {
    for (n <- 3 to 8) {
      val h = TestGraphs.hypergraph(TestGraphs.complete(n), 2, 3)
      assert(Peeling.decompose(h).forall(_ == n - 2), s"K$n")
    }
  }

  test("K_n (3,4) numbers are n-3") {
    for (n <- 4 to 8) {
      val h = TestGraphs.hypergraph(TestGraphs.complete(n), 3, 4)
      assert(Peeling.decompose(h).forall(_ == n - 3), s"K$n")
    }
  }

  test("cycle graph: all core numbers 2, no triangles") {
    val n = 10
    val pairs = (0 until n).map(i => (math.min(i, (i + 1) % n), math.max(i, (i + 1) % n))).toArray
    assert(Peeling.decompose(TestGraphs.hypergraph(pairs, 1, 2)).forall(_ == 2))
    assert(TestGraphs.hypergraph(pairs, 2, 3).numS == 0)
  }

  test("star graph: centre and leaves all have core number 1") {
    val pairs = (1 to 9).map(i => (0, i)).toArray
    assert(Peeling.decompose(TestGraphs.hypergraph(pairs, 1, 2)).forall(_ == 1))
  }

  test("paper Figure 3 toy graph core numbers") {
    val kappa = Peeling.decompose(TestGraphs.hypergraph(TestGraphs.fig3, 1, 2))
    // a=0, b=1, c=2, d=3, e=4, f=5: triangle {b,c,d} is the 2-core.
    assert(kappa.toSeq == Seq(1, 2, 2, 2, 1, 1))
  }

  test("two K4s joined by a bridge edge: truss numbers") {
    // Vertices 0-3 and 4-7 complete; bridge 3-4.
    val pairs = (TestGraphs.complete(4) ++
      TestGraphs.complete(4).map { case (u, v) => (u + 4, v + 4) } ++
      Array((3, 4))).sorted
    val h = TestGraphs.hypergraph(pairs, 2, 3)
    val kappa = Peeling.decompose(h)
    val g = repro.graph.LocalGraph.fromPairs(pairs)
    val bridge = g.edgeId(3, 4)
    assert(kappa(bridge) == 0)
    assert(kappa.zipWithIndex.filter(_._2 != bridge).forall(_._1 == 2))
  }

  test("matches the by-definition oracle on random graphs, all (r,s)") {
    for (seed <- 1 to 12; (r, s) <- Seq((1, 2), (2, 3), (3, 4))) {
      val pairs = TestGraphs.randomGraph(12, 0.35, seed)
      val h = TestGraphs.hypergraph(pairs, r, s)
      val got = Peeling.decompose(h).toSeq
      val exp = TestGraphs.kappaByDefinition(h).toSeq
      assert(got == exp, s"(r,s)=($r,$s) seed=$seed")
    }
  }

  test("matches the by-definition oracle on denser random graphs") {
    for (seed <- 1 to 6) {
      val pairs = TestGraphs.randomGraph(10, 0.6, seed + 100)
      for ((r, s) <- Seq((1, 2), (2, 3), (3, 4))) {
        val h = TestGraphs.hypergraph(pairs, r, s)
        assert(Peeling.decompose(h).toSeq == TestGraphs.kappaByDefinition(h).toSeq,
               s"(r,s)=($r,$s) seed=$seed")
      }
    }
  }

  test("kappa is bounded by the S-degree") {
    for (seed <- 1 to 8) {
      val h = TestGraphs.hypergraph(TestGraphs.randomGraph(14, 0.4, seed), 2, 3)
      val kappa = Peeling.decompose(h)
      for (r <- 0 until h.numR) assert(kappa(r) <= h.degree(r))
    }
  }
}
