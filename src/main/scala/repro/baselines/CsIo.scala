package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._

/** CS_IO (Vitorovic et al., §3.1): the state-of-the-art join-matrix
  * covering approach.
  *
  * Pipeline reproduced here:
  *  1. impose a *row-major* total order on the join-attribute space
  *     (§5.2: lexicographic by (A1, ..., Ad) — the order the paper
  *     selected for its experiments);
  *  2. range-partition S and T into g quantile ranges each (rows /
  *     columns of the coarsened join matrix), quantiles from the input
  *     sample;
  *  3. gather exact per-range statistics over the full data (count +
  *     bounding box per dimension) with one Spark aggregation per input;
  *  4. mark cell (i, j) as a candidate iff row i's S-bounding-box and
  *     column j's T-bounding-box are within band width in every
  *     dimension (conservative: never misses a joining pair);
  *  5. weight candidate cells with exact input counts and sampled output
  *     and cover them with at most w regions using binary search on the
  *     max region load and row-major greedy packing (the M-Bucket-I
  *     covering scheme CS_IO builds on — see DESIGN.md §5 for why this
  *     replaces the paper's O(n^5 log n) exact tiling).
  *
  * An S-tuple is shipped to every region that owns a candidate cell in
  * its row; T-tuples symmetrically by column. Each candidate cell is
  * owned by exactly one region, so each output pair is produced exactly
  * once — in the region owning cell (row(s), col(t)).
  */
final class CsIoPartitioning(
    sBounds: Array[Array[Double]],
    tBounds: Array[Array[Double]],
    g: Int,
    cellRegion: Map[Long, Int],
    rowRegions: Array[Array[Int]],
    colRegions: Array[Array[Int]],
    regionWorker: Array[Int],
    val numWorkers: Int) extends BandPartitioning {

  def numRegions: Int = regionWorker.length

  /** Index of the quantile range containing `x` under the lex order. */
  def rowOf(x: Array[Double]): Int = CsIo.rangeOf(sBounds, x)
  def colOf(x: Array[Double]): Int = CsIo.rangeOf(tBounds, x)

  private def fallback(i: Int): Array[Int] =
    Array(math.floorMod(i, math.max(numRegions, 1)))

  override def assignS(x: Array[Double], salt: Long): Array[Int] = {
    val r = rowRegions(rowOf(x))
    if (r.nonEmpty) r else fallback(rowOf(x))
  }

  override def assignT(x: Array[Double], salt: Long): Array[Int] = {
    val c = colRegions(colOf(x))
    if (c.nonEmpty) c else fallback(colOf(x))
  }

  override def partitionWorker(pid: Int): Int = regionWorker(pid)

  override def pairPartition(s: Array[Double], sSalt: Long,
                             t: Array[Double], tSalt: Long): Int =
    cellRegion(rowOf(s).toLong * g + colOf(t))
}

final case class CsIoResult(part: CsIoPartitioning, optTimeMs: Double,
                            numRegions: Int, numCandidateCells: Int)

object CsIo {

  /** Lexicographic (row-major, §5.2) comparison of attribute points. */
  def lexCompare(a: Array[Double], b: Array[Double]): Int = {
    var i = 0
    while (i < a.length) {
      if (a(i) < b(i)) return -1
      if (a(i) > b(i)) return 1
      i += 1
    }
    0
  }

  /** Number of boundaries lex-<= x == index of the range containing x. */
  def rangeOf(bounds: Array[Array[Double]], x: Array[Double]): Int = {
    var lo = 0; var hi = bounds.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (lexCompare(bounds(mid), x) <= 0) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Equal-weight quantile boundaries (g-1 of them) from sample points. */
  def quantileBounds(pts: Array[WPoint], g: Int): Array[Array[Double]] = {
    val sorted = pts.map(_.x).sortWith(lexCompare(_, _) < 0)
    if (sorted.isEmpty) return Array.empty
    (1 until g).map { i =>
      sorted(math.min(sorted.length - 1, i * sorted.length / g))
    }.toArray
  }

  private final case class RangeStats(count: Long, lo: Array[Double], hi: Array[Double])

  /** Exact count + bounding box per quantile range, via one Spark pass. */
  private def rangeStats(df: DataFrame, dims: Seq[String],
                         bounds: Array[Array[Double]], g: Int): Array[RangeStats] = {
    val spark = df.sparkSession
    import spark.implicits._
    val d = dims.length
    val stats = df.select(dims.map(c => col(c).cast("double")): _*)
      .map { r =>
        val x = Array.tabulate(d)(i => r.getDouble(i))
        (rangeOf(bounds, x), x)
      }
      .groupByKey(_._1)
      .mapGroups { (rng, it) =>
        var cnt = 0L
        val lo = Array.fill(d)(Double.PositiveInfinity)
        val hi = Array.fill(d)(Double.NegativeInfinity)
        it.foreach { case (_, x) =>
          cnt += 1
          var i = 0
          while (i < d) {
            if (x(i) < lo(i)) lo(i) = x(i)
            if (x(i) > hi(i)) hi(i) = x(i)
            i += 1
          }
        }
        (rng, cnt, lo, hi)
      }
      .collect()
    val out = Array.fill(g)(RangeStats(0L, Array.fill(d)(0.0), Array.fill(d)(-1.0)))
    stats.foreach { case (rng, cnt, lo, hi) => out(rng) = RangeStats(cnt, lo, hi) }
    out
  }

  private def boxesJoinable(a: RangeStats, b: RangeStats, band: BandSpec): Boolean = {
    if (a.count == 0 || b.count == 0) return false
    var i = 0
    while (i < band.d) {
      if (a.lo(i) - band.eps(i) > b.hi(i) || b.lo(i) - band.eps(i) > a.hi(i)) return false
      i += 1
    }
    true
  }

  /** Build the CS_IO partitioning. `g0` = number of quantile ranges per
    * input (0 picks `min(192, max(2w, 48))`).
    */
  def build(s: DataFrame, t: DataFrame, dims: Seq[String], band: BandSpec,
            w: Int, sample: JoinSample, load: LoadModel = LoadModel(),
            g0: Int = 0): CsIoResult = {
    val t0 = System.nanoTime()
    val g = if (g0 > 0) g0 else math.min(192, math.max(2 * w, 48))

    val sBounds = quantileBounds(sample.sPoints, g)
    val tBounds = quantileBounds(sample.tPoints, g)
    val sStats = rangeStats(s, dims, sBounds, g)
    val tStats = rangeStats(t, dims, tBounds, g)

    // Sampled output weight per coarsened-matrix cell.
    val outW = scala.collection.mutable.HashMap.empty[Long, Double]
    sample.pairs.foreach { p =>
      val key = rangeOf(sBounds, p.s).toLong * g + rangeOf(tBounds, p.t)
      outW(key) = outW.getOrElse(key, 0.0) + p.weight
    }

    // Candidate (relevant) columns per row, sorted.
    val relByRow: Array[Array[Int]] = Array.tabulate(g) { i =>
      (0 until g).filter(j => boxesJoinable(sStats(i), tStats(j), band)).toArray
    }
    val numCells = relByRow.map(_.length).sum

    // ----- M-Bucket-I covering -------------------------------------------
    // Regions are RECTANGLES (row interval × column interval) and every
    // candidate cell is owned by exactly one region — both properties are
    // required for exactly-once output: a joining pair is computed in
    // every region that receives both tuples, and for rectangles that is
    // precisely the single owner of cell (row(s), col(t)).
    final case class Rect(r1: Int, r2: Int, c1: Int, c2: Int, in: Double, out: Double)

    // Cover the candidate cells of rows r1..r2 with column-interval
    // rectangles of load <= cap; None if a single column already
    // overflows the cap.
    def coverBlock(r1: Int, r2: Int, cap: Double): Option[Vector[Rect]] = {
      val cols = (r1 to r2).flatMap(relByRow(_)).distinct.sorted.toArray
      if (cols.isEmpty) return Some(Vector.empty)
      val blockS = (r1 to r2).map(sStats(_).count).sum.toDouble
      def colIn(j: Int): Double = tStats(j).count.toDouble
      def cellOut(j: Int): Double =
        (r1 to r2).iterator.map(i => outW.getOrElse(i.toLong * g + j, 0.0)).sum
      val rects = Vector.newBuilder[Rect]
      var kStart = 0
      var in = blockS
      var out = 0.0
      var k = 0
      while (k < cols.length) {
        val j = cols(k)
        val dIn = colIn(j); val dOut = cellOut(j)
        if (k > kStart && load.load(in + dIn, out + dOut) > cap) {
          rects += Rect(r1, r2, cols(kStart), cols(k - 1), in, out)
          kStart = k; in = blockS; out = 0.0
        } else if (k == kStart && load.load(blockS + dIn, dOut) > cap) {
          return None // a single column exceeds the cap
        }
        in += dIn; out += dOut
        k += 1
      }
      rects += Rect(r1, r2, cols(kStart), cols(cols.length - 1), in, out)
      Some(rects.result())
    }

    // Greedy block construction: for the next uncovered row, pick the
    // block height maximizing covered-cells per region (M-Bucket-I's
    // score), bounded for cost.
    def pack(cap: Double): Option[Vector[Rect]] = {
      val all = Vector.newBuilder[Vector[Rect]]
      var count = 0
      var r1 = 0
      val maxH = math.max(4, 3 * g / math.max(w, 1))
      while (r1 < g) {
        var bestH = 1
        var bestRects: Option[Vector[Rect]] = coverBlock(r1, r1, cap)
        if (bestRects.isEmpty) return None
        var bestScore =
          relByRow(r1).length.toDouble / math.max(bestRects.get.length, 1)
        var h = 2
        while (h <= maxH && r1 + h - 1 < g) {
          coverBlock(r1, r1 + h - 1, cap) match {
            case Some(rs) =>
              val cellsHere = (r1 until r1 + h).map(relByRow(_).length).sum
              val sc = cellsHere.toDouble / math.max(rs.length, 1)
              if (sc > bestScore) { bestScore = sc; bestH = h; bestRects = Some(rs) }
            case None =>
          }
          h += 1
        }
        all += bestRects.get
        count += bestRects.get.length
        if (count > math.max(w, 1)) return None
        r1 += bestH
      }
      Some(all.result().flatten)
    }

    val totalLoad = load.load(
      (sStats.map(_.count).sum + tStats.map(_.count).sum).toDouble * g,
      outW.values.sum)
    var lo = 1e-9
    var hi = math.max(totalLoad, 1.0)
    var bestPack: Vector[Rect] = pack(hi).getOrElse(Vector.empty)
    var iter = 0
    while (iter < 48 && hi / lo > 1.001) {
      val mid = math.sqrt(lo * hi)
      pack(mid) match {
        case Some(p) => bestPack = p; hi = mid
        case None    => lo = mid
      }
      iter += 1
    }
    val regions = bestPack

    // Assign each candidate cell to the (unique) rectangle covering it.
    val cellRegion = scala.collection.mutable.HashMap.empty[Long, Int]
    for (i <- 0 until g; j <- relByRow(i)) {
      val r = regions.indices.find(k =>
        regions(k).r1 <= i && i <= regions(k).r2 &&
          regions(k).c1 <= j && j <= regions(k).c2)
      r.foreach(k => cellRegion(i.toLong * g + j) = k)
    }
    val rowRegions = Array.tabulate(g) { i =>
      relByRow(i).flatMap(j => cellRegion.get(i.toLong * g + j)).distinct.sorted
    }
    val colRegions = Array.tabulate(g) { j =>
      (0 until g).flatMap(i => cellRegion.get(i.toLong * g + j)).distinct.sorted.toArray
    }
    // LPT over region loads → workers. A disjoint-input instance has no
    // candidate cells at all: keep one inert region so every tuple still
    // has a (trivial) home, as Definition 1 requires.
    val regionLoads = regions.map(r => load.load(r.in, r.out)).toArray
    val regionWorker =
      if (regions.isEmpty) Array(0) else Lpt.assign(regionLoads, w)

    val part = new CsIoPartitioning(sBounds, tBounds, g, cellRegion.toMap,
      rowRegions, colRegions, regionWorker, w)
    val ms = (System.nanoTime() - t0) / 1e6
    CsIoResult(part, ms, regions.length, numCells)
  }
}
