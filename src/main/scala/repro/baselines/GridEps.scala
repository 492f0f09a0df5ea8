package repro.baselines

import repro.core._

/** Grid-ε (Soloviev's truncating-hash algorithm generalized to d
  * dimensions, §3.1): the join-attribute space is cut into a grid of
  * cells of side `cell(i) = j·εi` per dimension. An S-tuple goes to the
  * single cell containing it; a T-tuple is copied to every cell its
  * ε-range intersects (up to 3 per dimension for j = 1, hence the
  * O(3^d) replication). Cells are hashed onto the w workers.
  *
  * Undefined for any εi = 0 (the paper reports "N/A" there).
  */
final case class GridEps(band: BandSpec, numWorkers: Int,
                         multiplier: Double = 1.0) extends BandPartitioning {
  require(band.eps.forall(_ > 0), "Grid-ε is not defined for band width zero")
  require(multiplier > 0)

  private val cell: Array[Double] = band.eps.map(_ * multiplier)
  private def d: Int = band.d

  /** Grid coordinate of value `v` in dimension `i`. */
  def coord(v: Double, i: Int): Long = math.floor(v / cell(i)).toLong

  /** Stable partition id of a grid cell (hash of its coordinates). */
  def cellPid(coords: Array[Long]): Int = {
    var h = 0x9747b28cL
    var i = 0
    while (i < coords.length) { h = SplitTree.mix(h ^ coords(i)); i += 1 }
    (h & 0x7fffffffL).toInt
  }

  /** Inclusive range of grid coordinates the ε-range around `v`
    * intersects in dimension `i`: `[v-εi, v+εi]`.
    */
  def coordRange(v: Double, i: Int): (Long, Long) =
    (coord(v - band.eps(i), i), coord(v + band.eps(i), i))

  override def assignS(x: Array[Double], salt: Long): Array[Int] =
    Array(cellPid(Array.tabulate(d)(i => coord(x(i), i))))

  override def assignT(x: Array[Double], salt: Long): Array[Int] = {
    val ranges = Array.tabulate(d)(i => coordRange(x(i), i))
    val out = scala.collection.mutable.ArrayBuffer.empty[Int]
    val cur = ranges.map(_._1)
    var doneAll = false
    while (!doneAll) {
      out += cellPid(cur.clone())
      // odometer increment over the per-dimension coordinate ranges
      var i = 0
      var carry = true
      while (carry && i < d) {
        if (cur(i) < ranges(i)._2) { cur(i) += 1; carry = false }
        else { cur(i) = ranges(i)._1; i += 1 }
      }
      if (carry) doneAll = true
    }
    out.distinct.toArray
  }

  /** Analytic copy count: Π over dimensions of cells intersected —
    * avoids enumerating up to 3^d cells per tuple in high d.
    */
  override def tMultiplicity(x: Array[Double], salt: Long): Int = {
    var m = 1L
    var i = 0
    while (i < d) {
      val (lo, hi) = coordRange(x(i), i)
      m *= (hi - lo + 1)
      i += 1
    }
    math.min(m, Int.MaxValue).toInt
  }

  override def sMultiplicity(x: Array[Double], salt: Long): Int = 1

  override def partitionWorker(pid: Int): Int = math.floorMod(pid, numWorkers)

  /** A pair is produced in the cell containing s (t is copied there). */
  override def pairPartition(s: Array[Double], sSalt: Long,
                             t: Array[Double], tSalt: Long): Int =
    assignS(s, sSalt)(0)
}
