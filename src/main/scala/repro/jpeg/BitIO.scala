package repro.jpeg

/** MSB-first bit stream writer over a growable byte buffer. Each entropy-
  * coded scan is an independent, byte-aligned bit stream, which is what lets
  * the PCR layout concatenate scans from different images into scan groups.
  */
final class BitWriter(initialCapacity: Int = 256) {
  private var buf = new Array[Byte](math.max(16, initialCapacity))
  private var byteLen = 0
  private var cur = 0 // bits accumulated into the current byte
  private var nCur = 0

  private def ensure(n: Int): Unit =
    if (byteLen + n > buf.length) {
      buf = java.util.Arrays.copyOf(buf, math.max(buf.length * 2, byteLen + n))
    }

  def writeBit(b: Int): Unit = {
    cur = (cur << 1) | (b & 1)
    nCur += 1
    if (nCur == 8) { ensure(1); buf(byteLen) = cur.toByte; byteLen += 1; cur = 0; nCur = 0 }
  }

  /** Write the low `n` bits of `v`, MSB first. n may be 0 (no-op). */
  def writeBits(v: Int, n: Int): Unit = {
    require(n >= 0 && n <= 32, s"bad bit count $n")
    var i = n - 1
    while (i >= 0) { writeBit((v >>> i) & 1); i -= 1 }
  }

  def bitLength: Long = byteLen.toLong * 8 + nCur

  /** Pad the final partial byte with 1s (like JPEG) and return the bytes. */
  def toBytes: Array[Byte] = {
    val out =
      if (nCur == 0) java.util.Arrays.copyOf(buf, byteLen)
      else {
        val padded = (cur << (8 - nCur)) | ((1 << (8 - nCur)) - 1)
        val o = java.util.Arrays.copyOf(buf, byteLen + 1)
        o(byteLen) = padded.toByte
        o
      }
    out
  }
}

/** MSB-first bit reader over a byte array. Reading past the end yields 1s
  * (the padding value), mirroring how JPEG decoders treat the stream tail.
  */
final class BitReader(bytes: Array[Byte]) {
  private var pos = 0L
  private val nBits = bytes.length.toLong * 8

  def readBit(): Int = {
    if (pos >= nBits) { pos += 1; 1 }
    else {
      val b = (bytes((pos >> 3).toInt) >> (7 - (pos & 7)).toInt) & 1
      pos += 1
      b
    }
  }

  def readBits(n: Int): Int = {
    var v = 0; var i = 0
    while (i < n) { v = (v << 1) | readBit(); i += 1 }
    v
  }

  def bitsRead: Long = pos
  def exhausted: Boolean = pos >= nBits
}
