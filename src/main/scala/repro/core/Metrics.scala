package repro.core

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions.col

/** Exact quality measures of a join partitioning (§2):
  *
  *  - `i`  — total input incl. duplicates, `I = Σ_x |h(x)|`
  *  - `im` / `om` — input / output assigned to the most loaded worker
  *  - `lm` — max worker load `max_w β2·I_w + β3·O_w`
  *  - `dupOverhead`  — `(I - (|S|+|T|)) / (|S|+|T|)`  (0 is the lower bound)
  *  - `loadOverhead` — `(Lm - L0) / L0`               (0 is the lower bound)
  */
final case class PartMetrics(
    sCount: Long, tCount: Long, outCount: Long,
    i: Long, im: Long, om: Long,
    lm: Double, l0: Double,
    dupOverhead: Double, loadOverhead: Double,
    perWorkerInput: Array[Long], perWorkerOutput: Array[Long]) {
  def inputLowerBound: Long = sCount + tCount
}

object Metrics {

  /** Compute exact metrics for `part` over inputs (s, t) and the join's
    * output `pairs` (partitioning-independent; compute once per config
    * with any correct partitioning and reuse across all strategies).
    *
    * Partitions are mapped to workers by LPT over their *realized* loads
    * — the deterministic proxy for the dynamic scheduling both the
    * paper's YARN cluster and our Spark executor apply at runtime (a
    * worker picks up the next partition when it frees up, so placement
    * follows actual, not estimated, load).
    *
    * When the exploded input would exceed `explodeLimit` rows (Grid-ε in
    * 8 dimensions reaches thousands-fold duplication), per-worker input
    * falls back to the uniform proxy `I/w` — justified because the cell
    * count then vastly exceeds w, which is exactly the regime the paper
    * observes (`Im = I/w` in its Grid-ε columns). `I` itself is always
    * exact via per-tuple multiplicities.
    */
  def compute(s: DataFrame, t: DataFrame, dims: Seq[String],
              part: BandPartitioning, pairs: Dataset[PairRow],
              load: LoadModel = LoadModel(),
              explodeLimit: Long = 30000000L): PartMetrics = {
    val spark = s.sparkSession
    import spark.implicits._
    val w = part.numWorkers
    val d = dims.length

    def points(df: DataFrame): Dataset[(Long, Array[Double])] =
      df.select((col("id").cast("long") +: dims.map(c => col(c).cast("double"))): _*)
        .map(r => (r.getLong(0), Array.tabulate(d)(i => r.getDouble(i + 1))))

    val sPts = points(s)
    val tPts = points(t)
    val sCount = sPts.count()
    val tCount = tPts.count()

    val iS = sPts.map { case (id, x) => part.sMultiplicity(x, id).toLong }
      .reduce(_ + _)
    val iT = tPts.map { case (id, x) => part.tMultiplicity(x, id).toLong }
      .reduce(_ + _)
    val i = iS + iT

    val outByPid: Map[Int, Long] = pairs
      .map(p => part.pairPartition(p.s, p.sid, p.t, p.tid))
      .groupByKey(identity).count().collect().toMap
    val outCount = outByPid.values.sum

    val (perWorkerInput, perWorkerOutput) =
      if (i <= explodeLimit) {
        val inByPid: Map[Int, Long] = sPts.flatMap { case (id, x) => part.assignS(x, id) }
          .union(tPts.flatMap { case (id, x) => part.assignT(x, id) })
          .groupByKey(identity).count().collect().toMap
        scheduleByRealizedLoad(inByPid, outByPid, w, load)
      } else {
        // input spread uniformly (#partitions >> w); outputs still LPT'd
        val base = Array.tabulate(w)(k => i / w + (if (k < i % w) 1L else 0L))
        val (_, outW) = scheduleByRealizedLoad(Map.empty, outByPid, w, load)
        (base, outW)
      }

    val workerLoads = Array.tabulate(w)(wk =>
      load.load(perWorkerInput(wk).toDouble, perWorkerOutput(wk).toDouble))
    var mx = 0
    for (k <- 1 until w) if (workerLoads(k) > workerLoads(mx)) mx = k
    val lm = workerLoads(mx)
    val l0 = load.lowerBound(sCount.toDouble, tCount.toDouble, outCount.toDouble, w)
    val input0 = (sCount + tCount).toDouble
    PartMetrics(
      sCount, tCount, outCount, i, perWorkerInput(mx), perWorkerOutput(mx),
      lm, l0,
      dupOverhead = (i - input0) / input0,
      loadOverhead = if (l0 > 0) (lm - l0) / l0 else 0.0,
      perWorkerInput = perWorkerInput, perWorkerOutput = perWorkerOutput)
  }

  /** LPT per-partition loads onto w workers; returns per-worker
    * (input, output) sums. Exposed for brute-force comparison in tests.
    */
  def scheduleByRealizedLoad(inByPid: Map[Int, Long], outByPid: Map[Int, Long],
                             w: Int, load: LoadModel): (Array[Long], Array[Long]) = {
    val pids = (inByPid.keySet ++ outByPid.keySet).toArray.sorted
    val loads = pids.map(p => load.load(
      inByPid.getOrElse(p, 0L).toDouble, outByPid.getOrElse(p, 0L).toDouble))
    val assign = Lpt.assign(loads, w)
    val inW = Array.fill(w)(0L)
    val outW = Array.fill(w)(0L)
    for (k <- pids.indices) {
      inW(assign(k)) += inByPid.getOrElse(pids(k), 0L)
      outW(assign(k)) += outByPid.getOrElse(pids(k), 0L)
    }
    (inW, outW)
  }
}
