package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HIndexSpec extends AnyFunSuite {

  private def check(xs: Seq[Int], expected: Int): Unit = {
    assert(HIndex.naive(xs) == expected, s"naive on $xs")
    assert(HIndex.linear(xs.toArray, xs.length) == expected, s"linear on $xs")
  }

  test("empty set has h-index 0") { check(Seq.empty, 0) }
  test("single zero") { check(Seq(0), 0) }
  test("single positive") { check(Seq(5), 1) }
  test("all ones") { check(Seq(1, 1, 1), 1) }
  test("classic citation example") { check(Seq(10, 8, 5, 4, 3), 4) }
  test("paper Figure 2 example: {2,2,1,1} -> 2") { check(Seq(2, 2, 1, 1), 2) }
  test("paper Figure 3 example: {2,3} -> 2") { check(Seq(2, 3), 2) }
  test("paper Figure 3 example: {2,2,2} -> 2") { check(Seq(2, 2, 2), 2) }
  test("paper Figure 3 example: {1,2} -> 1") { check(Seq(1, 2), 1) }
  test("paper Figure 3 example: {1,3} -> 1") { check(Seq(1, 3), 1) }
  test("uniform k of length k") { check(Seq.fill(4)(4), 4) }
  test("uniform k of length k+1") { check(Seq.fill(5)(4), 4) }
  test("values above length clamp to length") { check(Seq(100, 100, 100), 3) }
  test("zeros do not contribute") { check(Seq(0, 0, 0, 9), 1) }
  test("descending staircase") { check(Seq(5, 4, 3, 2, 1), 3) }
  test("order invariance") { check(Seq(1, 9, 2, 8, 3), 3) }

  test("linear == naive on 500 random multisets") {
    val rnd = new scala.util.Random(12345)
    for (_ <- 1 to 500) {
      val len = rnd.nextInt(40)
      val xs = Seq.fill(len)(rnd.nextInt(50))
      assert(HIndex.linear(xs.toArray, len) == HIndex.naive(xs), s"mismatch on $xs")
    }
  }

  test("h-index is monotone: decreasing an element never increases H") {
    val rnd = new scala.util.Random(999)
    for (_ <- 1 to 200) {
      val len = 1 + rnd.nextInt(20)
      val xs = Array.fill(len)(rnd.nextInt(20))
      val h0 = HIndex.linear(xs, len)
      val i = rnd.nextInt(len)
      val dec = xs.clone(); dec(i) = math.max(0, dec(i) - 1 - rnd.nextInt(3))
      assert(HIndex.linear(dec, len) <= h0)
    }
  }

  test("h-index bounded by multiset size and max element") {
    val rnd = new scala.util.Random(7)
    for (_ <- 1 to 200) {
      val len = rnd.nextInt(30)
      val xs = Array.fill(len)(rnd.nextInt(100))
      val h = HIndex.linear(xs, len)
      assert(h <= len)
      if (len > 0) assert(h <= xs.max)
    }
  }

  test("scratch reuse gives identical answers across calls") {
    val s = new HIndexScratch(32)
    val rnd = new scala.util.Random(31337)
    for (_ <- 1 to 300) {
      val len = rnd.nextInt(32)
      val xs = Array.fill(len)(rnd.nextInt(40))
      System.arraycopy(xs, 0, s.vals, 0, len)
      assert(s.hIndex(len) == HIndex.naive(xs.toSeq))
    }
  }

  test("scratch rejects over-capacity input") {
    val s = new HIndexScratch(4)
    intercept[IllegalArgumentException] { s.hIndex(5) }
  }
}
