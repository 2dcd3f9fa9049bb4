package repro.jpeg

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class BitIOSpec extends AnyFunSuite with PropSupport {

  test("bit sequences round-trip") {
    checkProp(Prop.forAll(Gen.listOf(Gen.oneOf(0, 1))) { bits =>
      val w = new BitWriter()
      bits.foreach(w.writeBit)
      val r = new BitReader(w.toBytes)
      bits.forall(b => r.readBit() == b)
    })
  }

  test("multi-bit values round-trip") {
    val valueGen = for {
      n <- Gen.choose(0, 24)
      v <- Gen.choose(0, if (n == 0) 0 else (1 << n) - 1)
    } yield (v, n)
    checkProp(Prop.forAll(Gen.listOf(valueGen)) { pairs =>
      val w = new BitWriter()
      pairs.foreach { case (v, n) => w.writeBits(v, n) }
      val r = new BitReader(w.toBytes)
      pairs.forall { case (v, n) => r.readBits(n) == v }
    })
  }

  test("bitLength counts exactly") {
    val w = new BitWriter()
    assert(w.bitLength == 0)
    w.writeBits(5, 3)
    assert(w.bitLength == 3)
    w.writeBits(0xff, 8)
    assert(w.bitLength == 11)
  }

  test("padding fills the final byte with 1s") {
    val w = new BitWriter()
    w.writeBits(0, 3) // 000 + 11111 padding
    assert(w.toBytes.sameElements(Array(0x1f.toByte)))
  }

  test("byte length is ceil(bits/8)") {
    checkProp(Prop.forAll(Gen.choose(0, 100)) { n =>
      val w = new BitWriter()
      (0 until n).foreach(_ => w.writeBit(1))
      w.toBytes.length == (n + 7) / 8
    })
  }

  test("reading past the end yields padding 1s") {
    val r = new BitReader(Array[Byte]())
    assert(r.readBit() == 1)
    assert(r.readBits(5) == 31)
  }

  test("writer grows beyond its initial capacity") {
    val w = new BitWriter(initialCapacity = 1)
    (0 until 10000).foreach(i => w.writeBit(i & 1))
    val r = new BitReader(w.toBytes)
    (0 until 10000).foreach(i => assert(r.readBit() == (i & 1)))
  }

  test("negative bit counts are rejected") {
    assertThrows[IllegalArgumentException](new BitWriter().writeBits(0, -1))
  }
}
