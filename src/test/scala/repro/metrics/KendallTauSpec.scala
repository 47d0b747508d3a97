package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

class KendallTauSpec extends AnyFunSuite {

  test("identical lists score 1.0") {
    assert(KendallTau.strict(Array(1, 2, 3), Array(1, 2, 3)) == 1.0)
    assert(KendallTau.strict(Array(5, 5, 5), Array(5, 5, 5)) == 1.0)
  }

  test("singleton and empty lists score 1.0") {
    assert(KendallTau.strict(Array(3), Array(9)) == 1.0)
    assert(KendallTau.strict(Array.empty[Int], Array.empty[Int]) == 1.0)
  }

  test("strictly reversed lists score -1.0") {
    assert(KendallTau.strict(Array(1, 2, 3, 4), Array(4, 3, 2, 1)) == -1.0)
  }

  test("tie on one side only counts as discordant (paper's strict adaptation)") {
    // x ties the pair, y distinguishes it: discordant under the adaptation.
    assert(KendallTau.strict(Array(1, 1), Array(1, 2)) == -1.0)
    // Classic Kendall-Tau would call this pair neither; the paper's version
    // penalizes it, so a constant approximation of a varying list scores -1.
    assert(KendallTau.strict(Array(7, 7, 7), Array(1, 2, 3)) == -1.0)
  }

  test("ties on both sides are concordant") {
    assert(KendallTau.strict(Array(2, 2, 5), Array(9, 9, 11)) == 1.0)
  }

  test("same partition but different labels still scores 1.0") {
    assert(KendallTau.strict(Array(0, 0, 1, 2), Array(10, 10, 20, 30)) == 1.0)
  }

  test("matches naive implementation on random lists") {
    val rnd = new scala.util.Random(42)
    for (trial <- 1 to 200) {
      val n = 2 + rnd.nextInt(30)
      val x = Array.fill(n)(rnd.nextInt(8))
      val y = Array.fill(n)(rnd.nextInt(8))
      val fast = KendallTau.strict(x, y)
      val slow = KendallTau.naive(x, y)
      assert(math.abs(fast - slow) < 1e-12, s"trial $trial: x=${x.toSeq} y=${y.toSeq}")
    }
  }

  test("matches naive on lists with heavy ties") {
    val rnd = new scala.util.Random(43)
    for (_ <- 1 to 100) {
      val n = 2 + rnd.nextInt(40)
      val x = Array.fill(n)(rnd.nextInt(3))
      val y = Array.fill(n)(rnd.nextInt(3))
      assert(math.abs(KendallTau.strict(x, y) - KendallTau.naive(x, y)) < 1e-12)
    }
  }

  test("score is symmetric in its arguments") {
    val rnd = new scala.util.Random(44)
    for (_ <- 1 to 50) {
      val n = 2 + rnd.nextInt(20)
      val x = Array.fill(n)(rnd.nextInt(6))
      val y = Array.fill(n)(rnd.nextInt(6))
      assert(math.abs(KendallTau.strict(x, y) - KendallTau.strict(y, x)) < 1e-12)
    }
  }

  test("rejects length mismatch") {
    intercept[IllegalArgumentException] { KendallTau.strict(Array(1), Array(1, 2)) }
  }

  test("accuracy: fraction of exact matches") {
    assert(Accuracy.of(Array(1, 2, 3), Array(1, 2, 3)) == 1.0)
    assert(Accuracy.of(Array(1, 2, 3), Array(1, 0, 3)) == 2.0 / 3)
    assert(Accuracy.of(Array.empty[Int], Array.empty[Int]) == 1.0)
  }

  test("accuracy rejects length mismatch") {
    intercept[IllegalArgumentException] { Accuracy.of(Array(1), Array(1, 2)) }
  }
}
