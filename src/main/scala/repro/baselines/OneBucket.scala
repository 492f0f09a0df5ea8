package repro.baselines

import repro.core._

/** 1-Bucket (Okcan & Riedewald, §3.1): covers the entire join matrix
  * S × T with an r × c grid of regions, one per worker. Each S-tuple is
  * assigned a pseudo-random row (and is shipped to all c regions of that
  * row); each T-tuple a pseudo-random column (shipped to all r regions
  * of that column). A joining pair meets in exactly region
  * (row(s), col(t)). Input duplication is ≈ √w-fold; the cover — and
  * hence I, Im — is independent of the dimensionality of the join
  * condition (visible in the paper's Tables 2a vs 2b).
  */
final case class OneBucket(r: Int, c: Int, numWorkers: Int) extends BandPartitioning {
  require(r >= 1 && c >= 1 && r * c <= math.max(numWorkers, 1))

  private def row(salt: Long): Int =
    math.floorMod(SplitTree.mix(salt ^ 0x0B0CA7L), r).toInt
  private def colOf(salt: Long): Int =
    math.floorMod(SplitTree.mix(salt ^ 0x1B0CA7L), c).toInt

  override def assignS(x: Array[Double], salt: Long): Array[Int] = {
    val rw = row(salt)
    Array.tabulate(c)(j => rw * c + j)
  }

  override def assignT(x: Array[Double], salt: Long): Array[Int] = {
    val cl = colOf(salt)
    Array.tabulate(r)(i => i * c + cl)
  }

  override def sMultiplicity(x: Array[Double], salt: Long): Int = c
  override def tMultiplicity(x: Array[Double], salt: Long): Int = r

  override def partitionWorker(pid: Int): Int = pid

  override def pairPartition(s: Array[Double], sSalt: Long,
                             t: Array[Double], tSalt: Long): Int =
    row(sSalt) * c + colOf(tSalt)
}

object OneBucket {
  /** The most square r × c grid with r·c <= w (the standard 1-Bucket
    * choice maximizing worker utilization while minimizing the
    * duplication factor r + c).
    */
  def forWorkers(w: Int): OneBucket = {
    require(w >= 1)
    var best = (1, w)
    var bestKey = (Int.MaxValue, 0)
    for (r <- 1 to w) {
      val c = w / r
      // S is copied c times and T r times; minimize total copies r + c,
      // and on ties prefer using more of the w workers (larger r·c).
      val key = (r + c, -(r * c))
      if (r * c <= w && Ordering[(Int, Int)].lt(key, bestKey)) {
        best = (r, c); bestKey = key
      }
    }
    OneBucket(best._1, best._2, w)
  }
}
