package repro.storage

import org.scalatest.funsuite.AnyFunSuite

class StorageModelSpec extends AnyFunSuite {

  test("read time is seek plus bytes over bandwidth") {
    val d = DiskModel(100e6, 0.01)
    assert(math.abs(d.readSeconds(100e6) - 1.01) < 1e-12)
    assert(math.abs(d.readSeconds(0) - 0.01) < 1e-12)
    assert(math.abs(d.readSeconds(50e6, nSeeks = 2) - 0.52) < 1e-12)
  }

  test("sequential large reads amortize seeks; per-file reads do not") {
    val d = DiskModel.hdd
    val imageBytes = 5000.0
    val n = 1000
    val sequential = d.readSeconds(imageBytes * n, nSeeks = 1)
    val perFile = (0 until n).map(_ => d.readSeconds(imageBytes, nSeeks = 1)).sum
    // This asymmetry is the paper's 25× File-per-Image slowdown mechanism.
    assert(perFile / sequential > 20, s"ratio ${perFile / sequential}")
  }

  test("model invariants are enforced") {
    assertThrows[IllegalArgumentException](DiskModel(0, 0.01))
    assertThrows[IllegalArgumentException](DiskModel(1e6, -1))
  }

  test("token bucket: burst within capacity is immediate") {
    val tb = new TokenBucket(1000.0, 5000.0)
    assert(tb.acquire(5000.0, 0.0) == 0.0)
  }

  test("token bucket: drained bucket waits at the refill rate") {
    val tb = new TokenBucket(1000.0, 5000.0)
    assert(tb.acquire(5000.0, 0.0) == 0.0)
    val t = tb.acquire(2000.0, 0.0)
    assert(math.abs(t - 2.0) < 1e-9, s"waited $t")
  }

  test("token bucket: refills while idle, capped at capacity") {
    val tb = new TokenBucket(1000.0, 3000.0)
    assert(tb.acquire(3000.0, 0.0) == 0.0)
    // After 10 s idle only `capacity` tokens are available.
    assert(math.abs(tb.availableAt(10.0) - 3000.0) < 1e-9)
  }

  test("token bucket: long-run throughput equals the rate") {
    val rate = 1000.0
    val tb = new TokenBucket(rate, 100.0)
    var t = 0.0
    val total = 50000.0
    var consumed = 0.0
    while (consumed < total) { t = tb.acquire(500.0, t); consumed += 500.0 }
    assert(math.abs(total / t - rate) / rate < 0.02, s"effective rate ${total / t}")
  }

  test("token bucket: requests larger than capacity drain continuously") {
    val tb = new TokenBucket(1000.0, 100.0)
    val t = tb.acquire(10100.0, 0.0)
    assert(math.abs(t - 10.0) < 1e-9, s"waited $t")
  }

  test("token bucket: time cannot go backwards") {
    val tb = new TokenBucket(1000.0, 100.0)
    tb.acquire(50.0, 5.0)
    assertThrows[IllegalArgumentException](tb.acquire(1.0, 1.0))
  }

  test("preset device models have sane magnitudes") {
    assert(DiskModel.hdd.bandwidthBytesPerSec > 1e8)
    assert(DiskModel.hdd.seekLatencySec > DiskModel.ssd.seekLatencySec)
  }
}
