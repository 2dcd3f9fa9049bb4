package repro.jpeg

/** Standard JPEG (Annex K) quantization tables plus the libjpeg quality
  * scaling rule. Higher quality → smaller divisors → more surviving AC
  * coefficients → larger files; this is the knob behind the per-dataset
  * `Quality` column of the paper's Table 3.
  */
object Quantization {

  /** ITU-T T.81 Table K.1 — luminance. Row-major 8×8. */
  val baseLuma: Array[Int] = Array(
    16, 11, 10, 16, 24, 40, 51, 61,
    12, 12, 14, 19, 26, 58, 60, 55,
    14, 13, 16, 24, 40, 57, 69, 56,
    14, 17, 22, 29, 51, 87, 80, 62,
    18, 22, 37, 56, 68, 109, 103, 77,
    24, 35, 55, 64, 81, 104, 113, 92,
    49, 64, 78, 87, 103, 121, 120, 101,
    72, 92, 95, 98, 112, 100, 103, 99)

  /** ITU-T T.81 Table K.2 — chrominance. Row-major 8×8. */
  val baseChroma: Array[Int] = Array(
    17, 18, 24, 47, 99, 99, 99, 99,
    18, 21, 26, 66, 99, 99, 99, 99,
    24, 26, 56, 99, 99, 99, 99, 99,
    47, 66, 99, 99, 99, 99, 99, 99,
    99, 99, 99, 99, 99, 99, 99, 99,
    99, 99, 99, 99, 99, 99, 99, 99,
    99, 99, 99, 99, 99, 99, 99, 99,
    99, 99, 99, 99, 99, 99, 99, 99)

  /** libjpeg `jpeg_quality_scaling`: quality 1..100 → table scaled so that
    * 50 is the base table, 100 is all-ones (lossless up to DCT rounding).
    */
  def scale(base: Array[Int], quality: Int): Array[Int] = {
    require(quality >= 1 && quality <= 100, s"quality must be in [1,100], got $quality")
    val s = if (quality < 50) 5000 / quality else 200 - 2 * quality
    base.map { q =>
      val v = (q * s + 50) / 100
      math.max(1, math.min(255, v))
    }
  }

  def luma(quality: Int): Array[Int]   = scale(baseLuma, quality)
  def chroma(quality: Int): Array[Int] = scale(baseChroma, quality)
}
