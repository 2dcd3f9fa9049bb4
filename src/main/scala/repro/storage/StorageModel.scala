package repro.storage

/** Cost model for a storage device: a fixed per-request setup cost (seek /
  * request latency) plus bytes at sequential bandwidth. This is the paper's
  * read-latency assumption (App. A.2: "read latencies are proportional to
  * the number of bytes read … after an input-size-independent setup cost").
  */
final case class DiskModel(bandwidthBytesPerSec: Double, seekLatencySec: Double) {
  require(bandwidthBytesPerSec > 0, "bandwidth must be positive")
  require(seekLatencySec >= 0, "seek latency must be non-negative")

  /** Seconds to serve a read of `bytes` issued as `nSeeks` request(s). */
  def readSeconds(bytes: Double, nSeeks: Int = 1): Double =
    nSeeks * seekLatencySec + bytes / bandwidthBytesPerSec
}

object DiskModel {
  /** 7200 RPM HDD like the paper's Seagate ST4000NM0023: ~8.5 ms seek,
    * ~160 MB/s sequential.
    */
  val hdd: DiskModel = DiskModel(160e6, 0.0085)

  /** SATA SSD like the paper's P100-node data disk (§7): negligible seek. */
  val ssd: DiskModel = DiskModel(400e6, 0.0001)
}

/** Deterministic fluid token bucket in virtual time — the paper's §6.6
  * bandwidth limiter ("each second, a node accumulates a fixed amount of
  * tokens, which are traded for bytes read off storage").
  */
final class TokenBucket(ratePerSec: Double, capacity: Double, initialTokens: Double) {
  require(ratePerSec > 0 && capacity > 0, "rate and capacity must be positive")
  private var tokens = math.min(initialTokens, capacity)
  private var lastTime = 0.0

  def this(ratePerSec: Double, capacity: Double) = this(ratePerSec, capacity, capacity)

  private def refill(now: Double): Unit = {
    require(now + 1e-12 >= lastTime, s"time went backwards: $now < $lastTime")
    tokens = math.min(capacity, tokens + (now - lastTime) * ratePerSec)
    lastTime = now
  }

  /** Acquire `amount` tokens starting at virtual time `now`; returns the
    * time at which the full amount is available (≥ `now`). Requests larger
    * than the capacity drain continuously at the refill rate.
    */
  def acquire(amount: Double, now: Double): Double = {
    require(amount >= 0, "amount must be non-negative")
    refill(now)
    if (tokens >= amount) { tokens -= amount; now }
    else {
      val wait = (amount - tokens) / ratePerSec
      tokens = 0.0
      lastTime = now + wait
      lastTime
    }
  }

  def availableAt(now: Double): Double = {
    refill(now)
    tokens
  }
}
