package repro.core

import org.apache.spark.sql.DataFrame
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

/** Which rule ends the repeat-loop of Algorithm 1 (§4.2). */
sealed trait Termination
object Termination {
  /** Cost-model driven: stop when predicted join time stops improving by
    * >= 1% over a window of `w` iterations; winner minimizes `M`.
    */
  case object Applied extends Termination
  /** Model-free: stop once duplication overhead exceeds the smallest
    * max-load overhead seen; winner minimizes max{dupOH, loadOH}.
    */
  case object Theoretical extends Termination
}

/** Configuration for the RecPart optimizer.
  *
  * @param w          number of (logical) workers
  * @param symmetric  enable S-splits (RecPart) or not (RecPart-S)
  * @param load       per-worker load model β2·I + β3·O
  * @param costModel  running-time model for the applied termination rule
  * @param termination which stopping rule / winner definition to use
  * @param maxIters   hard cap on repeat-loop iterations (0 = 12·w)
  * @param minImprovement applied-rule improvement threshold per window
  *                       (paper: 1%; <= 0 — the default — disables the
  *                       early stop and runs to the cap, see the note at
  *                       the window)
  */
final case class RecPartConfig(
    w: Int,
    symmetric: Boolean = true,
    load: LoadModel = LoadModel(),
    costModel: CostModel = CostModel.default,
    termination: Termination = Termination.Applied,
    maxIters: Int = 0,
    minImprovement: Double = 0.0,
    gridFallback: Boolean = false) {
  def iterCap: Int = if (maxIters > 0) maxIters else math.max(12 * w, 80)
}

/** Sample-estimated state of the partitioning after an iteration. */
final case class IterStats(
    iter: Int,
    numPartitions: Int,
    estI: Double, estIm: Double, estOm: Double, estLm: Double,
    dupOverhead: Double, loadOverhead: Double,
    predictedTime: Double, objective: Double)

/** Final per-leaf sample statistics (diagnostics / tests). */
final case class LeafStat(id: Int, r: Int, c: Int,
                          sW: Double, tW: Double, oW: Double,
                          score: Double, split: String, small: Boolean)

/** Result of running the optimizer. */
final case class RecPartResult(
    partitioning: TreePartitioning,
    iterations: Int,
    chosenIteration: Int,
    optTimeMs: Double,
    est: IterStats,
    trajectory: Vector[IterStats],
    leafStats: Seq[LeafStat])

/** RecPart (Algorithms 1 and 2): recursive partitioning of the
  * d-dimensional join-attribute space driven by the split score
  * ΔVariance-reduction / ΔDuplication-increase.
  */
object RecPart {

  /** Duplication floor (in tuples) for the split score
    * ΔVar/max(ΔDup, minDup). The paper scores zero-duplication splits as
    * "infinitely" better; a literal bonus constant loses the ΔVar
    * tie-break to floating-point absorption, so we realize the same
    * preference as a ratio whose floor is the *estimation resolution*:
    * the weight of one input-sample point. An estimated duplication of
    * zero only means "fewer than one sampled tuple", so scoring it as
    * exactly one sample point keeps zero-dup splits ranked by ΔVar while
    * preventing worthless zero-dup slivers from permanently shadowing
    * high-ΔVar splits that duplicate a little.
    */
  private def dupFloor(sample: JoinSample): Double =
    math.max(1.0, (sample.sCount + sample.tCount).toDouble /
      math.max(1, sample.sPoints.length + sample.tPoints.length))

  sealed private trait Split
  private final case class RegularSplit(dim: Int, x: Double, duplicateT: Boolean) extends Split
  private case object IncRow extends Split
  private case object IncCol extends Split

  // Mutable tree: a Slot owns the current node so a leaf can be replaced
  // in place when it is split.
  private final class Slot { var node: MNode = null }
  sealed private trait MNode
  private final class MInner(val dim: Int, val x: Double, val duplicateT: Boolean,
                             val left: Slot, val right: Slot) extends MNode
  private final class MLeaf(val leaf: Leaf) extends MNode

  private final class Leaf(
      val id: Int,
      var slot: Slot,
      val region: Region,
      val sPts: Array[WPoint],
      val tPts: Array[WPoint],
      val pairs: Array[WPair]) {
    var r: Int = 1
    var c: Int = 1
    var stamp: Int = 0
    var best: Option[(Double, Split)] = None

    val sW: Double = sPts.iterator.map(_.weight).sum
    val tW: Double = tPts.iterator.map(_.weight).sum
    val oW: Double = pairs.iterator.map(_.weight).sum

    /** Load of one internal 1-Bucket sub-partition at grid (rr, cc). */
    def subLoad(rr: Int, cc: Int, lm: LoadModel): Double =
      lm.load(sW / rr + tW / cc, oW / (rr.toDouble * cc))

    /** Σ l² over the rr·cc sub-partitions. */
    def sumSq(rr: Int, cc: Int, lm: LoadModel): Double = {
      val l = subLoad(rr, cc, lm)
      rr.toDouble * cc * l * l
    }

    /** Estimated shuffled input of this leaf incl. internal duplication. */
    def inputEst: Double = c * sW + r * tW
  }

  private final case class QE(score: Double, leafId: Int, stamp: Int)
  private val qeOrd: Ordering[QE] = Ordering.by((q: QE) => (q.score, -q.leafId))

  /** Run the optimizer on a drawn sample.
    *
    * @param rootRegion exact bounding box of S ∪ T in join-attribute
    *                   space (used only for the "small partition" check)
    */
  def optimize(sample: JoinSample, rootRegion: Region, band: BandSpec,
               cfg: RecPartConfig): RecPartResult = {
    val t0 = System.nanoTime()
    val (traj, _) = run(sample, rootRegion, band, cfg, iterCap = None)
    val best = traj.minBy(s => (s.objective, s.iter))
    val (_, state) = run(sample, rootRegion, band, cfg, iterCap = Some(best.iter))
    val part = materialize(state, band, cfg)
    val ms = (System.nanoTime() - t0) / 1e6
    val stats = state.leaves.values.map { l =>
      LeafStat(l.id, l.r, l.c, l.sW, l.tW, l.oW,
        l.best.map(_._1).getOrElse(0.0),
        l.best.map(_._2.toString).getOrElse("none"),
        l.region.smallEverywhere(band))
    }.toSeq
    RecPartResult(part, traj.size - 1, best.iter, ms, best, traj, stats)
  }

  /** Convenience wrapper: sample from DataFrames, compute the exact root
    * bounding box, then optimize.
    */
  def fromDataFrames(s: DataFrame, t: DataFrame, dims: Seq[String], band: BandSpec,
                     cfg: RecPartConfig, kIn: Int = 8000, kOut: Int = 8000,
                     seed: Long = 42): RecPartResult = {
    val sample = Samples.draw(s, t, dims, band, kIn, kOut, seed)
    val region = exactBounds(s, t, dims)
    optimize(sample, region, band, cfg)
  }

  /** Exact per-dimension min/max over S ∪ T. */
  def exactBounds(s: DataFrame, t: DataFrame, dims: Seq[String]): Region = {
    import org.apache.spark.sql.functions._
    val u = s.select(dims.map(c => col(c).cast("double").as(c)): _*)
      .unionByName(t.select(dims.map(c => col(c).cast("double").as(c)): _*))
    val aggs = dims.flatMap(c => Seq(min(col(c)), max(col(c))))
    val row = u.agg(aggs.head, aggs.tail: _*).collect()(0)
    val lo = Array.tabulate(dims.length)(i => row.getDouble(2 * i))
    val hi = Array.tabulate(dims.length)(i => row.getDouble(2 * i + 1))
    Region(lo, hi)
  }

  // ---------------------------------------------------------------------
  // Main loop
  // ---------------------------------------------------------------------

  private final class State(
      val leaves: mutable.LinkedHashMap[Int, Leaf],
      val rootSlot: Slot,
      val sCount: Long, val tCount: Long, val outEst: Double)

  private def run(sample: JoinSample, rootRegion: Region, band: BandSpec,
                  cfg: RecPartConfig, iterCap: Option[Int]): (Vector[IterStats], State) = {
    val rootSlot = new Slot
    var nextId = 0
    val leaves = mutable.LinkedHashMap.empty[Int, Leaf]

    def newLeaf(slot: Slot, region: Region, sp: Array[WPoint], tp: Array[WPoint],
                pr: Array[WPair]): Leaf = {
      val l = new Leaf(nextId, slot, region, sp, tp, pr)
      nextId += 1
      slot.node = new MLeaf(l)
      leaves(l.id) = l
      l
    }

    val root = newLeaf(rootSlot, rootRegion, sample.sPoints, sample.tPoints, sample.pairs)
    val state = new State(leaves, rootSlot, sample.sCount, sample.tCount, sample.outputEstimate)

    val k = variancePrefactor(cfg.w)
    val minDup = dupFloor(sample)
    val pq = mutable.PriorityQueue.empty[QE](qeOrd)

    def rescore(l: Leaf): Unit = {
      l.stamp += 1
      l.best = bestSplit(l, band, cfg, k, minDup)
      l.best.foreach { case (sc, _) => if (sc > 0) pq.enqueue(QE(sc, l.id, l.stamp)) }
    }
    rescore(root)

    val traj = Vector.newBuilder[IterStats]
    var iter = 0
    var stats = snapshot(state, cfg, iter)
    traj += stats
    var bestObjective = stats.objective
    val bestAt = ArrayBuffer(bestObjective) // best objective after i iterations
    var minLoadOH = stats.loadOverhead

    val cap = iterCap.getOrElse(cfg.iterCap)
    var done = iter >= cap

    while (!done) {
      // Pop the highest-scoring live leaf (Algorithm 1 line 6).
      var picked: Option[Leaf] = None
      while (picked.isEmpty && pq.nonEmpty) {
        val qe = pq.dequeue()
        leaves.get(qe.leafId) match {
          case Some(l) if l.stamp == qe.stamp && l.best.exists(_._1 > 0) => picked = Some(l)
          case _ => // stale entry
        }
      }
      picked match {
        case None => done = true
        case Some(leaf) =>
          leaf.best.get._2 match {
            case RegularSplit(dim, x, dupT) =>
              applyRegular(leaf, dim, x, dupT, band, newLeaf, leaves)
              // children were created by applyRegular; rescore them.
              leaves.values.toSeq.filter(_.best == null).foreach(rescore)
            case IncRow => leaf.r += 1; rescore(leaf)
            case IncCol => leaf.c += 1; rescore(leaf)
          }
          iter += 1
          stats = snapshot(state, cfg, iter)
          traj += stats
          if (stats.objective < bestObjective) bestObjective = stats.objective
          bestAt += bestObjective
          if (stats.loadOverhead < minLoadOH) minLoadOH = stats.loadOverhead

          if (iter >= cap) done = true
          else if (iterCap.isEmpty) cfg.termination match {
            case Termination.Theoretical =>
              // Duplication only grows; once it exceeds the best load
              // overhead seen, no later iteration can win.
              if (stats.dupOverhead > minLoadOH) done = true
            case Termination.Applied =>
              // The paper stops when predicted join time improves < 1%
              // over a window of w iterations — a pure optimization-time
              // saver. At our sample granularity the priority queue can
              // spend far more than w iterations on diminishing
              // zero-duplication splits (which leave max worker load
              // unchanged) before reaching the split that matters, so by
              // default (minImprovement <= 0) we run to the cap and let
              // the winner-selection pick the best iteration; a positive
              // minImprovement restores the paper's windowed stop.
              if (cfg.minImprovement > 0) {
                val win = 4 * cfg.w
                if (iter >= win) {
                  val before = bestAt(iter - win)
                  if (bestObjective > before * (1 - cfg.minImprovement)) done = true
                }
              }
          }
      }
    }
    (traj.result(), state)
  }

  /** `(w-1)/w²` — the prefactor of `V[P] = (w-1)/w² Σ l_p²` (§4.2). */
  def variancePrefactor(w: Int): Double = (w - 1).toDouble / (w.toDouble * w)

  private def applyRegular(
      leaf: Leaf, dim: Int, x: Double, duplicateT: Boolean, band: BandSpec,
      newLeaf: (Slot, Region, Array[WPoint], Array[WPoint], Array[WPair]) => Leaf,
      leaves: mutable.LinkedHashMap[Int, Leaf]): Unit = {
    val e = band.eps(dim)
    val (regL, regR) = leaf.region.split(dim, x)
    val (sL, sR, tL, tR) =
      if (duplicateT) (
        leaf.sPts.filter(_.x(dim) < x), leaf.sPts.filter(_.x(dim) >= x),
        leaf.tPts.filter(p => p.x(dim) - e < x), leaf.tPts.filter(p => p.x(dim) + e >= x))
      else (
        leaf.sPts.filter(p => p.x(dim) - e < x), leaf.sPts.filter(p => p.x(dim) + e >= x),
        leaf.tPts.filter(_.x(dim) < x), leaf.tPts.filter(_.x(dim) >= x))
    val routeBy: WPair => Double = if (duplicateT) _.s(dim) else _.t(dim)
    val (pL, pR) = leaf.pairs.partition(p => routeBy(p) < x)

    val ls = new Slot; val rs = new Slot
    leaf.slot.node = new MInner(dim, x, duplicateT, ls, rs)
    val childL = newLeaf(ls, regL, sL, tL, pL)
    val childR = newLeaf(rs, regR, sR, tR, pR)
    // Mark children as needing a rescore (picked up by the caller).
    childL.best = null
    childR.best = null
    leaves.remove(leaf.id)
  }

  // ---------------------------------------------------------------------
  // best_split (Algorithm 2)
  // ---------------------------------------------------------------------

  private def bestSplit(leaf: Leaf, band: BandSpec, cfg: RecPartConfig,
                        k: Double, minDup: Double): Option[(Double, Split)] = {
    if (oneBucketMode(leaf, band)) bestGridIncrement(leaf, cfg, k, minDup)
    else {
      val regular = bestRegularSplit(leaf, band, cfg, k, minDup)
      if (!cfg.gridFallback) regular
      else {
        // Optional extension (OFF by default — the paper grid-partitions
        // only small leaves): also offer the internal-1-Bucket step.
        // Arbitration between the two MECHANISMS is by net variance
        // reduction with a strong bias toward recursion (grid only wins
        // on a 4x ΔVar advantage): the ratio score is blind to leaves
        // whose sampled split candidates cannot separate a heavy output
        // clique (common in high d, where the clique leaf holds almost
        // no input samples) — there the best recursive split is a
        // high-ratio sliver while the grid step removes orders of
        // magnitude more variance. A leaf in grid mode may later be
        // regular-split (children restart at 1x1), so an early grid
        // switch cannot freeze a heavy leaf. The chosen option keeps its
        // own ΔVar/ΔDup ratio as the cross-leaf priority. Enabling this
        // for RecPart-S would mask the reverse-Pareto weakness that
        // Table 9 demonstrates, so benches enable it only for full
        // RecPart.
        val grid = bestGridIncrement(leaf, cfg, k, minDup)
        (regular, grid) match {
          case (Some(r), Some(g)) =>
            val rVar = varianceOf(r, leaf, band, cfg, k)
            val gVar = varianceOf(g, leaf, band, cfg, k)
            Some(if (gVar > 4 * rVar) g else r)
          case (r, g) => r.orElse(g)
        }
      }
    }
  }

  /** Recompute the ΔVar of a scored option (scores are ΔVar/dup; undo is
    * cheaper than threading ΔVar through every return).
    */
  private def varianceOf(opt: (Double, Split), leaf: Leaf, band: BandSpec,
                         cfg: RecPartConfig, k: Double): Double = opt._2 match {
    case IncRow => k * (leaf.sumSq(leaf.r, leaf.c, cfg.load) -
      leaf.sumSq(leaf.r + 1, leaf.c, cfg.load))
    case IncCol => k * (leaf.sumSq(leaf.r, leaf.c, cfg.load) -
      leaf.sumSq(leaf.r, leaf.c + 1, cfg.load))
    case RegularSplit(dim, x, dupT) =>
      val lm = cfg.load
      val e = band.eps(dim)
      def below(pts: Array[WPoint], v: Double) =
        pts.iterator.filter(_.x(dim) < v).map(_.weight).sum
      val (sL, sR, tL, tR) =
        if (dupT) (below(leaf.sPts, x), leaf.sW - below(leaf.sPts, x),
          below(leaf.tPts, x + e), leaf.tW - below(leaf.tPts, x - e))
        else (below(leaf.sPts, x + e), leaf.sW - below(leaf.sPts, x - e),
          below(leaf.tPts, x), leaf.tW - below(leaf.tPts, x))
      val coord: WPair => Double = if (dupT) _.s(dim) else _.t(dim)
      val oL = leaf.pairs.iterator.filter(p => coord(p) < x).map(_.weight).sum
      val l1 = lm.load(sL + tL, oL)
      val l2 = lm.load(sR + tR, leaf.oW - oL)
      k * (leaf.sumSq(1, 1, lm) - l1 * l1 - l2 * l2)
  }

  /** A leaf switches to internal 1-Bucket partitioning when it is small
    * (below 2ε) in every dimension, or — degenerate input — when no
    * dimension offers two distinct sample values to split between (all
    * tuples then join with each other, the Cartesian-product regime).
    */
  private def oneBucketMode(leaf: Leaf, band: BandSpec): Boolean = {
    if (leaf.region.smallEverywhere(band)) return true
    val d = band.d
    var dim = 0
    while (dim < d) {
      if (!leaf.region.smallInDim(dim, band)) {
        val vals = distinctSorted(leaf, dim)
        if (vals.length >= 2) return false
      }
      dim += 1
    }
    true
  }

  private def distinctSorted(leaf: Leaf, dim: Int): Array[Double] = {
    val b = new ArrayBuffer[Double](leaf.sPts.length + leaf.tPts.length)
    leaf.sPts.foreach(p => b += p.x(dim))
    leaf.tPts.foreach(p => b += p.x(dim))
    b.distinct.sorted.toArray
  }

  private def score(varReduction: Double, dup: Double, minDup: Double): Double =
    if (varReduction <= 0) 0.0
    else varReduction / math.max(dup, minDup)

  private def bestGridIncrement(leaf: Leaf, cfg: RecPartConfig,
                                k: Double, minDup: Double): Option[(Double, Split)] = {
    val lm = cfg.load
    val cur = leaf.sumSq(leaf.r, leaf.c, lm)
    val varRow = k * (cur - leaf.sumSq(leaf.r + 1, leaf.c, lm))
    val varCol = k * (cur - leaf.sumSq(leaf.r, leaf.c + 1, lm))
    val sRow = score(varRow, leaf.tW, minDup) // extra row duplicates T once more
    val sCol = score(varCol, leaf.sW, minDup) // extra column duplicates S once more
    if (sRow <= 0 && sCol <= 0) None
    else if (sRow >= sCol) Some((sRow, IncRow))
    else Some((sCol, IncCol))
  }

  private def bestRegularSplit(leaf: Leaf, band: BandSpec, cfg: RecPartConfig,
                               k: Double, minDup: Double): Option[(Double, Split)] = {
    val lm = cfg.load
    // Relative duplication floor: charging a split less than 2% of the
    // leaf's own input makes sliver splits (high ratio, negligible ΔVar)
    // outrank the load-relevant splits of the same leaf at our sample
    // scale; see DESIGN.md §6.
    val floorDup = math.max(minDup, 0.02 * (leaf.sW + leaf.tW))
    val curSq = leaf.sumSq(1, 1, lm)
    var bestScore = 0.0
    var best: Option[Split] = None

    val d = band.d
    var dim = 0
    while (dim < d) {
      if (!leaf.region.smallInDim(dim, band)) {
        val e = band.eps(dim)
        val (sVals, sPref) = sortedPrefix(leaf.sPts, dim)
        val (tVals, tPref) = sortedPrefix(leaf.tPts, dim)
        val (oSVals, oSPref) = sortedPairPrefix(leaf.pairs, dim, useS = true)
        val (oTVals, oTPref) = sortedPairPrefix(leaf.pairs, dim, useS = false)
        val cand = distinctSorted(leaf, dim)
        var i = 0
        while (i < cand.length - 1) {
          val x = (cand(i) + cand(i + 1)) / 2
          // T-split: partition S at x, duplicate T within ε of x.
          locally {
            val sL = weightBelow(sVals, sPref, x)
            val sR = leaf.sW - sL
            val tL = weightBelow(tVals, tPref, x + e)
            val tR = leaf.tW - weightBelow(tVals, tPref, x - e)
            val oL = weightBelow(oSVals, oSPref, x)
            val oR = leaf.oW - oL
            val dup = tL + tR - leaf.tW
            val l1 = lm.load(sL + tL, oL)
            val l2 = lm.load(sR + tR, oR)
            val sc = score(k * (curSq - l1 * l1 - l2 * l2), dup, floorDup)
            if (sc > bestScore) { bestScore = sc; best = Some(RegularSplit(dim, x, duplicateT = true)) }
          }
          // S-split: partition T at x, duplicate S within ε of x.
          if (cfg.symmetric) {
            val tL = weightBelow(tVals, tPref, x)
            val tR = leaf.tW - tL
            val sL = weightBelow(sVals, sPref, x + e)
            val sR = leaf.sW - weightBelow(sVals, sPref, x - e)
            val oL = weightBelow(oTVals, oTPref, x)
            val oR = leaf.oW - oL
            val dup = sL + sR - leaf.sW
            val l1 = lm.load(sL + tL, oL)
            val l2 = lm.load(sR + tR, oR)
            val sc = score(k * (curSq - l1 * l1 - l2 * l2), dup, floorDup)
            if (sc > bestScore) { bestScore = sc; best = Some(RegularSplit(dim, x, duplicateT = false)) }
          }
          i += 1
        }
      }
      dim += 1
    }
    best.map(s => (bestScore, s))
  }

  private def sortedPrefix(pts: Array[WPoint], dim: Int): (Array[Double], Array[Double]) = {
    val idx = pts.indices.toArray.sortBy(i => pts(i).x(dim))
    val vals = idx.map(i => pts(i).x(dim))
    val pref = new Array[Double](vals.length + 1)
    var i = 0
    while (i < vals.length) { pref(i + 1) = pref(i) + pts(idx(i)).weight; i += 1 }
    (vals, pref)
  }

  private def sortedPairPrefix(pairs: Array[WPair], dim: Int,
                               useS: Boolean): (Array[Double], Array[Double]) = {
    val coord: WPair => Double = if (useS) _.s(dim) else _.t(dim)
    val idx = pairs.indices.toArray.sortBy(i => coord(pairs(i)))
    val vals = idx.map(i => coord(pairs(i)))
    val pref = new Array[Double](vals.length + 1)
    var i = 0
    while (i < vals.length) { pref(i + 1) = pref(i) + pairs(idx(i)).weight; i += 1 }
    (vals, pref)
  }

  /** Σ of weights of entries with value < x. */
  private def weightBelow(vals: Array[Double], pref: Array[Double], x: Double): Double =
    pref(LocalJoin.lowerBound(vals, x))

  // ---------------------------------------------------------------------
  // Per-iteration estimates, termination bookkeeping, materialization
  // ---------------------------------------------------------------------

  private def snapshot(state: State, cfg: RecPartConfig, iter: Int): IterStats = {
    val lm = cfg.load
    val subs = ArrayBuffer.empty[(Double, Double, Double)] // (load, in, out)
    var estI = 0.0
    for (l <- state.leaves.values) {
      estI += l.inputEst
      val in = l.sW / l.r + l.tW / l.c
      val out = l.oW / (l.r.toDouble * l.c)
      val ld = lm.load(in, out)
      var i = 0
      val n = l.r * l.c
      while (i < n) { subs += ((ld, in, out)); i += 1 }
    }
    val loads = subs.map(_._1).toArray
    val assign = Lpt.assign(loads, cfg.w)
    val wIn = Array.fill(cfg.w)(0.0)
    val wOut = Array.fill(cfg.w)(0.0)
    val wLoad = Array.fill(cfg.w)(0.0)
    for (i <- subs.indices) {
      val wk = assign(i)
      wLoad(wk) += subs(i)._1; wIn(wk) += subs(i)._2; wOut(wk) += subs(i)._3
    }
    var mx = 0
    for (i <- 1 until cfg.w) if (wLoad(i) > wLoad(mx)) mx = i
    val lmX = wLoad(mx)
    val input0 = (state.sCount + state.tCount).toDouble
    val l0 = lm.lowerBound(state.sCount.toDouble, state.tCount.toDouble, state.outEst, cfg.w)
    val dupOH = (estI - input0) / input0
    val loadOH = if (l0 > 0) (lmX - l0) / l0 else 0.0
    val predicted = cfg.costModel.predict(estI, wIn(mx), wOut(mx))
    val objective = cfg.termination match {
      case Termination.Applied     => predicted
      case Termination.Theoretical => math.max(dupOH, loadOH)
    }
    IterStats(iter, subs.length, estI, wIn(mx), wOut(mx), lmX, dupOH, loadOH,
      predicted, objective)
  }

  private def materialize(state: State, band: BandSpec, cfg: RecPartConfig): TreePartitioning = {
    var pidBase = 0
    val subLoads = ArrayBuffer.empty[Double]
    def build(slot: Slot): SplitNode = slot.node match {
      case inner: MInner =>
        InnerNode(inner.dim, inner.x, inner.duplicateT, build(inner.left), build(inner.right))
      case ml: MLeaf =>
        val l = ml.leaf
        val node = LeafNode(l.id, l.r, l.c, pidBase)
        pidBase += l.r * l.c
        val ld = l.subLoad(l.r, l.c, cfg.load)
        var i = 0
        while (i < l.r * l.c) { subLoads += ld; i += 1 }
        node
    }
    val root = build(state.rootSlot)
    val pidWorker = Lpt.assign(subLoads.toArray, cfg.w)
    TreePartitioning(root, band, pidWorker, cfg.w)
  }
}
