package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.testutil.TestGraphs

class LocalGraphSpec extends AnyFunSuite {

  test("empty graph") {
    val g = LocalGraph.fromPairs(Array.empty)
    assert(g.n == 0 && g.m == 0)
  }

  test("single edge") {
    val g = LocalGraph.fromPairs(Array((0, 1)))
    assert(g.n == 2 && g.m == 1 && g.degree(0) == 1 && g.degree(1) == 1)
    assert(g.edgeId(0, 1) == 0 && g.edgeId(1, 0) == 0)
  }

  test("rejects non-canonical edges") {
    intercept[IllegalArgumentException] { LocalGraph.fromPairs(Array((1, 0))) }
  }

  test("degrees match brute force on random graphs") {
    for (seed <- 1 to 5) {
      val pairs = TestGraphs.randomGraph(20, 0.3, seed)
      val g = LocalGraph.fromPairs(pairs)
      for (v <- 0 until g.n) {
        val expected = pairs.count(e => e._1 == v || e._2 == v)
        assert(g.degree(v) == expected, s"vertex $v seed=$seed")
      }
    }
  }

  test("foreachNeighbor enumerates exactly the adjacency") {
    val pairs = TestGraphs.randomGraph(15, 0.4, 3)
    val g = LocalGraph.fromPairs(pairs)
    for (v <- 0 until g.n) {
      val got = scala.collection.mutable.Set.empty[Int]
      g.foreachNeighbor(v)((w, _) => got += w)
      val expected = pairs.collect { case (a, b) if a == v => b; case (a, b) if b == v => a }.toSet
      assert(got == expected, s"vertex $v")
    }
  }

  test("edge ids are consistent between edges array and adjacency") {
    val pairs = TestGraphs.randomGraph(15, 0.4, 9)
    val g = LocalGraph.fromPairs(pairs)
    for (v <- 0 until g.n) {
      g.foreachNeighbor(v) { (w, e) =>
        val (a, b) = g.edges(e)
        assert(Set(a, b) == Set(v, w), s"slot ($v,$w) claims edge $e=($a,$b)")
      }
    }
  }

  test("edgeId finds every edge and rejects non-edges") {
    val pairs = TestGraphs.randomGraph(12, 0.5, 4)
    val g = LocalGraph.fromPairs(pairs)
    val present = pairs.toSet
    for (u <- 0 until g.n; v <- u + 1 until g.n) {
      if (present((u, v))) assert(g.edges(g.edgeId(u, v)) == (u, v))
      else assert(g.edgeId(u, v) == -1)
    }
  }

  test("edge ids are assigned in sorted (u,v) order") {
    val g = LocalGraph.fromPairs(Array((2, 3), (0, 5), (0, 1)))
    assert(g.edges.toSeq == Seq((0, 1), (0, 5), (2, 3)))
  }
}
