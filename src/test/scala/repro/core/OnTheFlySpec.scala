package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.LocalGraph
import repro.testutil.TestGraphs

class OnTheFlySpec extends AnyFunSuite {

  private def fixtures(seed: Int, n: Int = 14, p: Double = 0.4) = {
    val pairs = TestGraphs.randomGraph(n, p, seed)
    val m = TestGraphs.materialize(pairs)
    (pairs, m)
  }

  test("truss: on-the-fly triangle counts equal hypergraph S-degrees") {
    for (seed <- 1 to 6) {
      val (_, m) = fixtures(seed)
      val h = NucleusBuilder.trussHypergraph(m)
      val eng = new TrussOnTheFly(m.graph)
      assert(eng.triangleCounts(1).toSeq == h.degrees.toSeq, s"seed=$seed")
    }
  }

  test("truss: on-the-fly peel equals hypergraph peeling") {
    for (seed <- 1 to 8) {
      val (_, m) = fixtures(seed)
      val h = NucleusBuilder.trussHypergraph(m)
      val eng = new TrussOnTheFly(m.graph)
      assert(eng.peel(1).toSeq == Peeling.decompose(h).toSeq, s"seed=$seed")
    }
  }

  test("truss: on-the-fly AND equals hypergraph AND exactly (kappa, iterations, work)") {
    for (seed <- 1 to 8) {
      val (_, m) = fixtures(seed)
      val h = NucleusBuilder.trussHypergraph(m)
      val a = And.decompose(h)
      val b = new TrussOnTheFly(m.graph).and(threads = 1)
      assert(b.kappa.toSeq == a.kappa.toSeq, s"seed=$seed")
      assert(b.iterations == a.iterations && b.passes == a.passes, s"seed=$seed")
      assert(b.tauComputations == a.tauComputations, s"seed=$seed")
    }
  }

  test("truss: parallel on-the-fly engines still converge to kappa") {
    for (seed <- 1 to 4) {
      val (_, m) = fixtures(seed, n = 25, p = 0.3)
      val h = NucleusBuilder.trussHypergraph(m)
      val exp = Peeling.decompose(h).toSeq
      val eng = new TrussOnTheFly(m.graph)
      assert(eng.peel(4).toSeq == exp)
      assert(eng.and(threads = 4).kappa.toSeq == exp)
    }
  }

  test("(3,4): on-the-fly K4 counts equal hypergraph S-degrees") {
    for (seed <- 1 to 6) {
      val (_, m) = fixtures(seed, p = 0.5)
      val h = NucleusBuilder.nucleus34Hypergraph(m)
      val eng = new Nucleus34OnTheFly(m.graph, m.tri)
      assert(eng.fourCliqueCounts(1).toSeq == h.degrees.toSeq, s"seed=$seed")
    }
  }

  test("(3,4): on-the-fly peel equals hypergraph peeling") {
    for (seed <- 1 to 8) {
      val (_, m) = fixtures(seed, p = 0.5)
      val h = NucleusBuilder.nucleus34Hypergraph(m)
      val eng = new Nucleus34OnTheFly(m.graph, m.tri)
      assert(eng.peel(1).toSeq == Peeling.decompose(h).toSeq, s"seed=$seed")
    }
  }

  test("(3,4): on-the-fly AND equals hypergraph AND exactly") {
    for (seed <- 1 to 8) {
      val (_, m) = fixtures(seed, p = 0.5)
      val h = NucleusBuilder.nucleus34Hypergraph(m)
      val a = And.decompose(h)
      val b = new Nucleus34OnTheFly(m.graph, m.tri).and(threads = 1)
      assert(b.kappa.toSeq == a.kappa.toSeq, s"seed=$seed")
      assert(b.iterations == a.iterations && b.passes == a.passes, s"seed=$seed")
      assert(b.tauComputations == a.tauComputations, s"seed=$seed")
    }
  }

  test("(3,4): parallel on-the-fly engines still converge to kappa") {
    for (seed <- 1 to 4) {
      val (_, m) = fixtures(seed, n = 16, p = 0.5)
      val h = NucleusBuilder.nucleus34Hypergraph(m)
      val exp = Peeling.decompose(h).toSeq
      val eng = new Nucleus34OnTheFly(m.graph, m.tri)
      assert(eng.peel(4).toSeq == exp)
      assert(eng.and(threads = 4).kappa.toSeq == exp)
    }
  }

  test("K_n closed forms via on-the-fly engines") {
    for (n <- 4 to 7) {
      val m = TestGraphs.materialize(TestGraphs.complete(n))
      assert(new TrussOnTheFly(m.graph).peel(1).forall(_ == n - 2), s"K$n truss")
      assert(new Nucleus34OnTheFly(m.graph, m.tri).peel(1).forall(_ == n - 3), s"K$n (3,4)")
    }
  }

  test("empty graph: engines return empty results") {
    val g = LocalGraph.fromPairs(Array.empty)
    assert(new TrussOnTheFly(g).peel(1).isEmpty)
    assert(new TrussOnTheFly(g).and(1).kappa.isEmpty)
    val e34 = new Nucleus34OnTheFly(g, Array.emptyIntArray)
    assert(e34.peel(1).isEmpty && e34.and(1).kappa.isEmpty)
  }

  test("triangle-free graph: truss engine yields all-zero kappa") {
    val cycle = (0 until 8).map(i => (math.min(i, (i + 1) % 8), math.max(i, (i + 1) % 8))).toArray
    val m = TestGraphs.materialize(cycle)
    assert(new TrussOnTheFly(m.graph).peel(1).forall(_ == 0))
  }
}
