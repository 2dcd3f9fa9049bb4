package repro.imaging

/** Multi-scale structural similarity (MS-SSIM, Wang et al. 2003) on the
  * luma plane. The paper's §6.4 uses MSSIM as a static estimator of the
  * accuracy cost of a scan group (scan 5+ sits at MSSIM ≥ 0.95).
  *
  * Implementation notes: 8×8 uniform windows with stride 4 (instead of the
  * 11×11 Gaussian) and per-scale full SSIM combined with the standard
  * weights, renormalized to the number of scales that fit the image. These
  * simplifications preserve the metric's ordering and its [0, 1] scale.
  */
object Mssim {
  private val C1 = math.pow(0.01 * 255, 2)
  private val C2 = math.pow(0.03 * 255, 2)
  private val weights = Array(0.0448, 0.2856, 0.3001, 0.2363, 0.1333)

  /** Mean single-scale SSIM over 8×8 windows (stride 4). */
  def ssim(a: Array[Double], b: Array[Double], w: Int, h: Int): Double = {
    require(a.length == w * h && b.length == w * h, "plane size mismatch")
    val win = 8; val stride = 4
    var sum = 0.0; var n = 0
    var y0 = 0
    while (y0 + win <= h) {
      var x0 = 0
      while (x0 + win <= w) {
        var sa = 0.0; var sb = 0.0; var saa = 0.0; var sbb = 0.0; var sab = 0.0
        var dy = 0
        while (dy < win) {
          var dx = 0
          val row = (y0 + dy) * w + x0
          while (dx < win) {
            val va = a(row + dx); val vb = b(row + dx)
            sa += va; sb += vb; saa += va * va; sbb += vb * vb; sab += va * vb
            dx += 1
          }
          dy += 1
        }
        val m = (win * win).toDouble
        val mua = sa / m; val mub = sb / m
        val vara = saa / m - mua * mua
        val varb = sbb / m - mub * mub
        val cov  = sab / m - mua * mub
        sum += ((2 * mua * mub + C1) * (2 * cov + C2)) /
               ((mua * mua + mub * mub + C1) * (vara + varb + C2))
        n += 1
        x0 += stride
      }
      y0 += stride
    }
    if (n == 0) 1.0 else sum / n
  }

  private def half(p: Array[Double], w: Int, h: Int): (Array[Double], Int, Int) = {
    val ow = w / 2; val oh = h / 2
    val out = new Array[Double](ow * oh)
    var y = 0
    while (y < oh) {
      var x = 0
      while (x < ow) {
        out(y * ow + x) = (p(2 * y * w + 2 * x) + p(2 * y * w + 2 * x + 1) +
          p((2 * y + 1) * w + 2 * x) + p((2 * y + 1) * w + 2 * x + 1)) / 4.0
        x += 1
      }
      y += 1
    }
    (out, ow, oh)
  }

  /** MS-SSIM of `test` against `ref` on the luma plane. */
  def msssim(ref: PlanarImage, test: PlanarImage): Double = {
    require(ref.width == test.width && ref.height == test.height, "size mismatch")
    var a = ref.y.map(_.toDouble); var b = test.y.map(_.toDouble)
    var w = ref.width; var h = ref.height
    val nScales = math.min(weights.length,
      (math.log(math.min(w, h) / 8.0) / math.log(2.0)).toInt + 1)
    val usedW = weights.take(nScales)
    val norm = usedW.sum
    var acc = 1.0
    var s = 0
    while (s < nScales) {
      val v = math.max(ssim(a, b, w, h), 1e-6)
      acc *= math.pow(v, usedW(s) / norm)
      if (s < nScales - 1) {
        val (a2, w2, h2) = half(a, w, h)
        val (b2, _, _)   = half(b, w, h)
        a = a2; b = b2; w = w2; h = h2
      }
      s += 1
    }
    acc
  }
}
