package repro.core

/** Band-join condition: `∀i |s.Ai - t.Ai| <= eps(i)`.
  *
  * @param eps per-dimension band widths (all >= 0); `eps.length` is the
  *            dimensionality d of the join.
  */
final case class BandSpec(eps: Array[Double]) extends Serializable {
  require(eps.nonEmpty && eps.forall(_ >= 0), "band widths must be >= 0")

  /** Number of join attributes (dimensions). */
  def d: Int = eps.length

  /** True iff the pair (s, t) is in the band-join output. */
  def matches(s: Array[Double], t: Array[Double]): Boolean = {
    var i = 0
    while (i < eps.length) {
      if (math.abs(s(i) - t(i)) > eps(i)) return false
      i += 1
    }
    true
  }

  override def toString: String = s"Band(${eps.mkString(",")})"
}

object BandSpec {
  /** Uniform band width `e` in each of `d` dimensions. */
  def uniform(d: Int, e: Double): BandSpec = BandSpec(Array.fill(d)(e))
}

/** Axis-aligned hyper-rectangle `[lo(i), hi(i)]` in join-attribute space.
  *
  * Used by RecPart for the "small partition" check; tuple routing itself
  * only uses split predicates and therefore covers unbounded space.
  */
final case class Region(lo: Array[Double], hi: Array[Double]) extends Serializable {
  require(lo.length == hi.length)

  def d: Int = lo.length

  /** Extent of the region in dimension `i`. */
  def length(i: Int): Double = hi(i) - lo(i)

  /** Paper §4.2: a partition is "small" in dimension i as soon as its
    * size is below twice the band width in that dimension. A zero band
    * width therefore never makes a dimension small.
    */
  def smallInDim(i: Int, band: BandSpec): Boolean =
    band.eps(i) > 0 && length(i) < 2 * band.eps(i)

  /** Small in every dimension: switch the leaf to 1-Bucket mode. */
  def smallEverywhere(band: BandSpec): Boolean =
    (0 until d).forall(smallInDim(_, band))

  /** The two sub-regions produced by splitting at `x` in dimension `dim`
    * (left child satisfies `A_dim < x` by the paper's convention).
    */
  def split(dim: Int, x: Double): (Region, Region) = {
    val lHi = hi.clone(); lHi(dim) = x
    val rLo = lo.clone(); rLo(dim) = x
    (Region(lo.clone(), lHi), Region(rLo, hi.clone()))
  }

  def contains(p: Array[Double]): Boolean = {
    var i = 0
    while (i < d) {
      if (p(i) < lo(i) || p(i) > hi(i)) return false
      i += 1
    }
    true
  }
}

object Region {
  /** Bounding box of a set of points (used for the root partition). */
  def bounding(points: Iterable[Array[Double]], d: Int): Region = {
    val lo = Array.fill(d)(Double.PositiveInfinity)
    val hi = Array.fill(d)(Double.NegativeInfinity)
    for (p <- points; i <- 0 until d) {
      if (p(i) < lo(i)) lo(i) = p(i)
      if (p(i) > hi(i)) hi(i) = p(i)
    }
    Region(lo, hi)
  }
}
