package repro.jpeg

/** One progressive scan: which components, which zigzag spectral band
  * [ss, se], and which bit-plane step (successive approximation Ah → Al).
  *
  *  - First pass (`ah == 0`): coefficients in the band are transmitted at
  *    precision `>> al`.
  *  - Refinement (`ah == al + 1`): one more magnitude bit per coefficient.
  *
  * Sequential JPEG is the degenerate script `ss=0, se=63, ah=0, al=0`.
  */
final case class ScanSpec(components: Seq[Int], ss: Int, se: Int, ah: Int, al: Int) {
  require(components.nonEmpty, "scan must cover at least one component")
  require(ss >= 0 && se <= 63 && ss <= se, s"bad spectral band [$ss,$se]")
  require(al >= 0 && (ah == 0 || ah == al + 1), s"bad successive approximation $ah->$al")
  require(ah == 0 || ss > 0 || se == 0, "DC refinement must be a DC-only scan")

  def isRefinement: Boolean = ah != 0
  def coversDc: Boolean = ss == 0
}

/** Scan scripts: ordered scan lists, validated so that every refinement
  * lands on coefficients previously transmitted at exactly depth `ah`.
  */
object ScanScript {

  /** The libjpeg default 10-scan progressive script for 3-component images
    * (`jcparam.c`, "standard script"), which the paper's jpegtran encoder
    * uses. Scan numbering here is 1-based in the paper; index 0 = scan 1.
    */
  val progressive10: Vector[ScanSpec] = Vector(
    ScanSpec(Seq(0, 1, 2), 0, 0, 0, 1),  // 1: DC of all comps, coarse
    ScanSpec(Seq(0), 1, 5, 0, 2),        // 2: Y low AC, coarse
    ScanSpec(Seq(1), 1, 63, 0, 1),       // 3: Cb AC
    ScanSpec(Seq(2), 1, 63, 0, 1),       // 4: Cr AC
    ScanSpec(Seq(0), 6, 63, 0, 2),       // 5: Y high AC, coarse
    ScanSpec(Seq(0), 1, 63, 2, 1),       // 6: Y AC refinement
    ScanSpec(Seq(0, 1, 2), 0, 0, 1, 0),  // 7: DC refinement
    ScanSpec(Seq(2), 1, 63, 1, 0),       // 8: Cr AC refinement
    ScanSpec(Seq(1), 1, 63, 1, 0),       // 9: Cb AC refinement
    ScanSpec(Seq(0), 1, 63, 1, 0))       // 10: Y AC final refinement

  /** Sequential ("baseline") script: each component in one full-band,
    * full-precision scan. Concatenated, this is the baseline JPEG payload.
    */
  def sequential(nComponents: Int): Vector[ScanSpec] =
    (0 until nComponents).map(c => ScanSpec(Seq(c), 0, 63, 0, 0)).toVector

  /** Validate script ordering: first passes hit untouched coefficients,
    * refinements hit coefficients previously left at depth `ah`. Returns
    * the final per-(component, zigzag) bit depth (`-1` = never covered).
    */
  def finalDepths(script: Seq[ScanSpec], nComponents: Int): Array[Array[Int]] = {
    val depth = Array.fill(nComponents, 64)(-1)
    for ((spec, si) <- script.zipWithIndex; c <- spec.components) {
      require(c < nComponents, s"scan $si references component $c of $nComponents")
      var k = spec.ss
      while (k <= spec.se) {
        if (spec.isRefinement) {
          require(depth(c)(k) == spec.ah,
            s"scan $si refines comp=$c k=$k at ah=${spec.ah} but depth=${depth(c)(k)}")
        } else {
          require(depth(c)(k) == -1,
            s"scan $si re-sends comp=$c k=$k already at depth ${depth(c)(k)}")
        }
        depth(c)(k) = spec.al
        k += 1
      }
    }
    depth
  }

  /** True when the script transmits every coefficient of every component
    * down to bit depth 0 (full fidelity, bit-identical to sequential).
    */
  def isComplete(script: Seq[ScanSpec], nComponents: Int): Boolean =
    finalDepths(script, nComponents).forall(_.forall(_ == 0))
}
