package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite

class ZigZagSpec extends AnyFunSuite {

  test("order is a permutation of 0..63") {
    assert(ZigZag.order.sorted.sameElements(0 until 64))
  }

  test("inverse really inverts") {
    (0 until 64).foreach(k => assert(ZigZag.inverse(ZigZag.order(k)) == k))
    (0 until 64).foreach(rm => assert(ZigZag.order(ZigZag.inverse(rm)) == rm))
  }

  test("the first coefficients follow the JPEG zigzag") {
    // (r,c): (0,0),(0,1),(1,0),(2,0),(1,1),(0,2),(0,3),(1,2)…
    val expected = Seq(0, 1, 8, 16, 9, 2, 3, 10, 17, 24)
    assert(ZigZag.order.take(10).toSeq == expected)
  }

  test("the traversal ends at the bottom-right corner") {
    assert(ZigZag.order(63) == 63)
    assert(ZigZag.order(62) == 62) // (7,6) precedes (7,7)
  }

  test("adjacent zigzag entries are grid neighbours (diagonal moves allowed)") {
    for (k <- 0 until 63) {
      val a = ZigZag.order(k); val b = ZigZag.order(k + 1)
      val dr = math.abs(a / 8 - b / 8); val dc = math.abs(a % 8 - b % 8)
      assert(dr <= 1 && dc <= 1 || (dr == 1 && dc == 0) || (dr == 0 && dc == 1),
        s"jump at k=$k: $a -> $b")
    }
  }
}
