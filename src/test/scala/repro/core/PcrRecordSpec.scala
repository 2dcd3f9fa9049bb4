package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class PcrRecordSpec extends AnyFunSuite with PropSupport {

  private def entry(id: Long, nScans: Int, seed: Int): PcrImageEntry = {
    val rng = new repro.imaging.Rng(seed)
    PcrImageEntry(id, (id % 7).toInt,
      Vector.tabulate(nScans)(g =>
        Array.fill((rng.nextDouble() * 50).toInt + g)((rng.nextLong() & 0xff).toByte)))
  }

  test("serialize/parse round-trips every scan group") {
    val entries = (0L until 5L).map(entry(_, 10, 1))
    val bytes = PcrRecord.serialize(64, 64, 92, entries)
    val (header, parsed) = PcrRecord.parsePrefix(bytes, 10)
    assert(header.nImages == 5 && header.nScanGroups == 10)
    assert(header.width == 64 && header.height == 64 && header.quality == 92)
    assert(parsed.map(_.id) == entries.map(_.id))
    assert(parsed.map(_.label) == entries.map(_.label))
    for ((a, b) <- parsed.zip(entries); (sa, sb) <- a.scans.zip(b.scans))
      assert(sa.sameElements(sb))
  }

  test("prefix parse at g returns exactly the first g scans") {
    val entries = (0L until 3L).map(entry(_, 10, 2))
    val bytes = PcrRecord.serialize(32, 32, 75, entries)
    for (g <- 1 to 10) {
      val prefix = bytes.take(PcrRecord.parseHeader(bytes).prefixLength(g).toInt)
      val (_, parsed) = PcrRecord.parsePrefix(prefix, g)
      parsed.zip(entries).foreach { case (p, e) =>
        assert(p.scans.length == g)
        p.scans.zip(e.scans.take(g)).foreach { case (sa, sb) => assert(sa.sameElements(sb)) }
      }
    }
  }

  test("group end offsets are strictly increasing and end at the file size") {
    val entries = (0L until 4L).map(entry(_, 6, 3))
    val bytes = PcrRecord.serialize(16, 16, 50, entries)
    val h = PcrRecord.parseHeader(bytes)
    assert(h.groupEndOffsets.length == 7)
    h.groupEndOffsets.sliding(2).foreach { case Array(a, b) => assert(a < b) }
    assert(h.totalLength == bytes.length)
    assert(h.headerLength == 24 + 12 * 4 + 8 * 7)
  }

  test("prefix length at scan group 0 is the header length") {
    val entries = Seq(entry(0, 3, 4))
    val bytes = PcrRecord.serialize(16, 16, 50, entries)
    val h = PcrRecord.parseHeader(bytes)
    assert(h.prefixLength(0) == h.headerLength)
    assertThrows[IllegalArgumentException](h.prefixLength(4))
    assertThrows[IllegalArgumentException](h.prefixLength(-1))
  }

  test("property: random records round-trip at random prefixes") {
    val recGen = for {
      n <- Gen.choose(1, 8)
      scans <- Gen.choose(1, 10)
      seed <- Gen.choose(0, 10000)
      g <- Gen.choose(1, scans)
    } yield ((0L until n.toLong).map(entry(_, scans, seed)), g)
    checkProp(Prop.forAll(recGen) { case (entries, g) =>
      val bytes = PcrRecord.serialize(16, 16, 80, entries)
      val (h, parsed) = PcrRecord.parsePrefix(bytes, g)
      h.nImages == entries.size &&
        parsed.zip(entries).forall { case (p, e) =>
          p.scans.length == g &&
            p.scans.zip(e.scans.take(g)).forall { case (a, b) => a.sameElements(b) }
        }
    }, n = 50)
  }

  test("corrupt and malformed inputs are rejected") {
    assertThrows[IllegalArgumentException](PcrRecord.serialize(16, 16, 50, Seq.empty))
    assertThrows[IllegalArgumentException](PcrRecord.parseHeader(Array[Byte](1, 2, 3)))
    assertThrows[IllegalArgumentException](
      PcrRecord.parseHeader(Array.fill[Byte](40)(0x7f.toByte)))
    val ragged = Seq(entry(0, 3, 5), entry(1, 4, 5))
    assertThrows[IllegalArgumentException](PcrRecord.serialize(16, 16, 50, ragged))
  }

  test("a too-short prefix for the requested group is rejected") {
    val entries = Seq(entry(0, 5, 6), entry(1, 5, 6))
    val bytes = PcrRecord.serialize(16, 16, 50, entries)
    val h = PcrRecord.parseHeader(bytes)
    val short = bytes.take(h.prefixLength(2).toInt)
    assertThrows[IllegalArgumentException](PcrRecord.parsePrefix(short, 3))
  }
}
