package repro.jpeg

import repro.imaging.PlanarImage

/** Quantized DCT coefficients for a whole image.
  *
  * `comps(c)(blockIndex)(zigzagIndex)` — component 0 is luma, 1/2 are the
  * half-resolution chroma planes. Blocks tile row-major. Storing zigzag
  * order directly makes spectral-band addressing in scans a range loop.
  */
final case class CoefImage(width: Int, height: Int, comps: Array[Array[Array[Int]]]) {
  def nComponents: Int = comps.length
}

/** JPEG-like codec: 8×8 DCT + standard quantization + progressive scans.
  *
  * Differences from real JPEG are confined to the entropy layer (fixed
  * 4+4-bit (run,size) symbols instead of Huffman tables, and per-scan
  * byte-aligned streams instead of one marker-delimited stream). Everything
  * the paper's measurements depend on — spectral selection, successive
  * approximation, quality-scaled quantization, chroma subsampling, and
  * bit-exact equivalence of full-progressive and sequential decoding — is
  * implemented faithfully.
  */
object Codec {

  // ---------------------------------------------------------------- helpers

  /** JPEG point transform for AC coefficients: sign-magnitude right shift. */
  private def pt(v: Int, al: Int): Int = if (v >= 0) v >> al else -((-v) >> al)

  /** Bit category of a value: smallest s with |v| < 2^s (0 for v == 0). */
  private def category(v: Int): Int = 32 - Integer.numberOfLeadingZeros(math.abs(v))

  /** JPEG signed value coding: positives as-is, negatives one's-complement. */
  private def writeSigned(bw: BitWriter, v: Int, s: Int): Unit =
    if (v >= 0) bw.writeBits(v, s) else bw.writeBits(v + (1 << s) - 1, s)

  private def readSigned(br: BitReader, s: Int): Int = {
    if (s == 0) 0
    else {
      val raw = br.readBits(s)
      if (raw < (1 << (s - 1))) raw - (1 << s) + 1 else raw
    }
  }

  // ------------------------------------------------------- pixels <-> coefs

  /** Forward path: level shift, per-block DCT, quality-scaled quantization. */
  def toCoefficients(img: PlanarImage, quality: Int): CoefImage = {
    val qLuma   = Quantization.luma(quality)
    val qChroma = Quantization.chroma(quality)
    def plane(px: Array[Int], w: Int, h: Int, q: Array[Int]): Array[Array[Int]] = {
      val bw = w / 8; val bh = h / 8
      val blocks = new Array[Array[Int]](bw * bh)
      val buf = new Array[Double](64)
      var by = 0
      while (by < bh) {
        var bx = 0
        while (bx < bw) {
          var i = 0
          while (i < 64) {
            buf(i) = px((by * 8 + i / 8) * w + bx * 8 + i % 8) - 128.0
            i += 1
          }
          val f = Dct.forward(buf)
          val zz = new Array[Int](64)
          var k = 0
          while (k < 64) {
            val rm = ZigZag.order(k)
            zz(k) = math.round(f(rm) / q(rm)).toInt
            k += 1
          }
          blocks(by * bw + bx) = zz
          bx += 1
        }
        by += 1
      }
      blocks
    }
    CoefImage(img.width, img.height, Array(
      plane(img.y, img.width, img.height, qLuma),
      plane(img.cb, img.chromaWidth, img.chromaHeight, qChroma),
      plane(img.cr, img.chromaWidth, img.chromaHeight, qChroma)))
  }

  /** Inverse path from (possibly partially received) coefficients.
    *
    * `depth(c)(k)` is the bit depth at which coefficient k of component c
    * was last received (`-1` = never → treated as 0). AC coefficients
    * received at depth > 0 are reconstructed at the magnitude midpoint,
    * matching how JPEG decoders render truncated progressive streams.
    */
  def fromCoefficients(ci: CoefImage, quality: Int, depth: Array[Array[Int]]): PlanarImage = {
    val qLuma   = Quantization.luma(quality)
    val qChroma = Quantization.chroma(quality)
    def plane(blocks: Array[Array[Int]], w: Int, h: Int, q: Array[Int], d: Array[Int]): Array[Int] = {
      val bw = w / 8
      val px = new Array[Int](w * h)
      val coefRm = new Array[Double](64)
      var b = 0
      while (b < blocks.length) {
        val zz = blocks(b)
        var k = 0
        while (k < 64) {
          val al = d(k)
          val v  = zz(k)
          val full: Int =
            if (al <= 0) { if (al < 0) 0 else v }
            else if (k == 0) v << al // DC: two's-complement shift semantics
            else if (v == 0) 0
            else {
              val mag = (math.abs(v) << al) + (1 << (al - 1))
              if (v > 0) mag else -mag
            }
          coefRm(ZigZag.order(k)) = full.toDouble * q(ZigZag.order(k))
          k += 1
        }
        val sp = Dct.inverse(coefRm)
        val bx = b % bw; val by = b / bw
        var i = 0
        while (i < 64) {
          px((by * 8 + i / 8) * w + bx * 8 + i % 8) = PlanarImage.clamp255(sp(i) + 128.0)
          i += 1
        }
        b += 1
      }
      px
    }
    PlanarImage(ci.width, ci.height,
      plane(ci.comps(0), ci.width, ci.height, qLuma, depth(0)),
      plane(ci.comps(1), ci.width / 2, ci.height / 2, qChroma, depth(1)),
      plane(ci.comps(2), ci.width / 2, ci.height / 2, qChroma, depth(2)))
  }

  // ------------------------------------------------------------- scan coder

  /** Entropy-encode one scan of `ci` into its own byte-aligned stream. */
  def encodeScan(ci: CoefImage, spec: ScanSpec): Array[Byte] = {
    val bw = new BitWriter()
    for (c <- spec.components) {
      val blocks = ci.comps(c)
      if (spec.coversDc && !spec.isRefinement) {
        // DC first pass: diff-coded arithmetic-shifted values.
        var prev = 0
        var b = 0
        while (b < blocks.length) {
          val v = blocks(b)(0) >> spec.al
          val diff = v - prev
          prev = v
          val s = category(diff)
          bw.writeBits(s, 4)
          writeSigned(bw, diff, s)
          b += 1
        }
      } else if (spec.coversDc && spec.isRefinement) {
        var b = 0
        while (b < blocks.length) {
          bw.writeBit((blocks(b)(0) >> spec.al) & 1)
          b += 1
        }
      }
      val acStart = math.max(1, spec.ss)
      if (spec.se >= acStart) {
        if (!spec.isRefinement) {
          // AC first pass: (run, size) symbols + signed value bits, EOB/ZRL.
          var b = 0
          while (b < blocks.length) {
            val zz = blocks(b)
            var run = 0
            var k = acStart
            while (k <= spec.se) {
              val v = pt(zz(k), spec.al)
              if (v == 0) run += 1
              else {
                while (run > 15) { bw.writeBits(15, 4); bw.writeBits(0, 4); run -= 16 }
                val s = category(v)
                bw.writeBits(run, 4); bw.writeBits(s, 4)
                writeSigned(bw, v, s)
                run = 0
              }
              k += 1
            }
            if (run > 0) { bw.writeBits(0, 4); bw.writeBits(0, 4) } // EOB
            b += 1
          }
        } else {
          // AC refinement: one correction bit per already-significant
          // coefficient, then an explicit list of newly-significant
          // positions (6-bit count, 6-bit position, sign bit). All-zero
          // bands cost 6 bits per block — like JPEG's EOB runs, this keeps
          // refinement scans proportional to content, not band width.
          var b = 0
          while (b < blocks.length) {
            val zz = blocks(b)
            var k = acStart
            var nNew = 0
            while (k <= spec.se) {
              val prevMag = math.abs(zz(k)) >> spec.ah
              val newMag  = math.abs(zz(k)) >> spec.al
              if (prevMag != 0) bw.writeBit(newMag & 1)
              else if (newMag != 0) nNew += 1
              k += 1
            }
            bw.writeBits(nNew, 6)
            k = acStart
            while (k <= spec.se) {
              val prevMag = math.abs(zz(k)) >> spec.ah
              val newMag  = math.abs(zz(k)) >> spec.al
              if (prevMag == 0 && newMag != 0) {
                bw.writeBits(k, 6)
                bw.writeBit(if (zz(k) > 0) 1 else 0)
              }
              k += 1
            }
            b += 1
          }
        }
      }
    }
    bw.toBytes
  }

  /** Encode all scans of a script; element i is the stream of scan i+1. */
  def encodeScript(ci: CoefImage, script: Seq[ScanSpec]): Vector[Array[Byte]] = {
    ScanScript.finalDepths(script, ci.nComponents) // validates ordering
    script.iterator.map(encodeScan(ci, _)).toVector
  }

  /** Decode the first `scans.length` scans of `script` back into received
    * coefficient values plus the per-coefficient bit depth reached.
    */
  def decodeScans(
      scans: Seq[Array[Byte]],
      script: Seq[ScanSpec],
      width: Int,
      height: Int): (CoefImage, Array[Array[Int]]) = {
    require(scans.length <= script.length,
      s"${scans.length} scan payloads but script has ${script.length}")
    val nc = 3
    def nBlocks(c: Int): Int =
      if (c == 0) (width / 8) * (height / 8) else (width / 16) * (height / 16)
    val comps = Array.tabulate(nc)(c => Array.fill(nBlocks(c))(new Array[Int](64)))
    val depth = Array.fill(nc, 64)(-1)

    for ((bytes, spec) <- scans.zip(script)) {
      val br = new BitReader(bytes)
      for (c <- spec.components) {
        val blocks = comps(c)
        if (spec.coversDc && !spec.isRefinement) {
          var prev = 0
          var b = 0
          while (b < blocks.length) {
            val s = br.readBits(4)
            val diff = readSigned(br, s)
            prev += diff
            blocks(b)(0) = prev
            b += 1
          }
        } else if (spec.coversDc && spec.isRefinement) {
          var b = 0
          while (b < blocks.length) {
            blocks(b)(0) = (blocks(b)(0) << 1) | br.readBit()
            b += 1
          }
        }
        val acStart = math.max(1, spec.ss)
        if (spec.se >= acStart) {
          if (!spec.isRefinement) {
            var b = 0
            while (b < blocks.length) {
              val zz = blocks(b)
              var k = acStart
              var done = false
              while (k <= spec.se && !done) {
                val run = br.readBits(4)
                val s   = br.readBits(4)
                if (run == 0 && s == 0) done = true          // EOB
                else if (run == 15 && s == 0) k += 16        // ZRL
                else {
                  k += run
                  zz(k) = readSigned(br, s)
                  k += 1
                }
              }
              b += 1
            }
          } else {
            var b = 0
            while (b < blocks.length) {
              val zz = blocks(b)
              var k = acStart
              while (k <= spec.se) {
                if (zz(k) != 0) {
                  val bit = br.readBit()
                  val mag = (math.abs(zz(k)) << 1) | bit
                  zz(k) = if (zz(k) > 0) mag else -mag
                }
                k += 1
              }
              val nNew = br.readBits(6)
              var i = 0
              while (i < nNew) {
                val pos = br.readBits(6)
                zz(pos) = if (br.readBit() == 1) 1 else -1
                i += 1
              }
              b += 1
            }
          }
        }
        var k = spec.ss
        while (k <= spec.se) { depth(c)(k) = spec.al; k += 1 }
      }
    }
    (CoefImage(width, height, comps), depth)
  }

  // ---------------------------------------------------------- public facade

  /** Progressive encode: one byte stream per scan of `script`. */
  def encodeProgressive(
      img: PlanarImage,
      quality: Int,
      script: Seq[ScanSpec] = ScanScript.progressive10): Vector[Array[Byte]] =
    encodeScript(toCoefficients(img, quality), script)

  /** Decode the first `scans.length` scans — the PCR "read up to scan group
    * g" path. Fewer scans → lower-fidelity reconstruction of all blocks.
    */
  def decodeProgressive(
      scans: Seq[Array[Byte]],
      quality: Int,
      width: Int,
      height: Int,
      script: Seq[ScanSpec] = ScanScript.progressive10): PlanarImage = {
    val (ci, depth) = decodeScans(scans, script, width, height)
    fromCoefficients(ci, quality, depth)
  }

  /** Baseline sequential encode: a single framed byte payload. */
  def encodeSequential(img: PlanarImage, quality: Int): Array[Byte] = {
    val scans = encodeScript(toCoefficients(img, quality), ScanScript.sequential(3))
    frame(scans)
  }

  /** Decode a baseline sequential payload produced by [[encodeSequential]]. */
  def decodeSequential(bytes: Array[Byte], quality: Int, width: Int, height: Int): PlanarImage = {
    val scans = unframe(bytes)
    decodeProgressive(scans, quality, width, height, ScanScript.sequential(3))
  }

  /** Pack per-scan streams into one payload: [n][len_i][bytes_i]…. */
  def frame(scans: Seq[Array[Byte]]): Array[Byte] = {
    val total = 4 + scans.map(s => 4 + s.length).sum
    val bb = java.nio.ByteBuffer.allocate(total)
    bb.putInt(scans.length)
    scans.foreach { s => bb.putInt(s.length); bb.put(s) }
    bb.array()
  }

  /** Inverse of [[frame]]. */
  def unframe(bytes: Array[Byte]): Vector[Array[Byte]] = {
    val bb = java.nio.ByteBuffer.wrap(bytes)
    val n = bb.getInt
    require(n >= 0 && n <= 64, s"corrupt frame header: $n scans")
    Vector.fill(n) {
      val len = bb.getInt
      val a = new Array[Byte](len)
      bb.get(a)
      a
    }
  }
}
