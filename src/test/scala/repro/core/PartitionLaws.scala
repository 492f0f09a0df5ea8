package repro.core

import org.scalatest.Assertions._

/** Shared law checker: Definition 1 requires every input tuple to be
  * assigned somewhere and every joining pair to be recoverable by
  * exactly one local join. Because a local join blindly joins all
  * co-located tuples, that means the assigned-partition sets of a
  * joining pair must intersect in exactly one partition — the one
  * `pairPartition` names.
  */
object PartitionLaws {

  def checkAssignmentsNonEmpty(part: BandPartitioning,
                               s: Seq[(Long, Array[Double])],
                               t: Seq[(Long, Array[Double])]): Unit = {
    for ((id, x) <- s) {
      val a = part.assignS(x, id)
      assert(a.nonEmpty, s"S tuple $id assigned nowhere")
      assert(a.distinct.length == a.length, s"S tuple $id has duplicate pids")
      a.foreach(p => part.partitionWorker(p)) // must not throw
    }
    for ((id, x) <- t) {
      val a = part.assignT(x, id)
      assert(a.nonEmpty, s"T tuple $id assigned nowhere")
      assert(a.distinct.length == a.length, s"T tuple $id has duplicate pids")
      a.foreach(p => part.partitionWorker(p))
    }
  }

  def checkExactlyOnce(part: BandPartitioning, band: BandSpec,
                       s: Seq[(Long, Array[Double])],
                       t: Seq[(Long, Array[Double])]): Unit = {
    for ((sid, sx) <- s; (tid, tx) <- t if band.matches(sx, tx)) {
      val common = part.assignS(sx, sid).toSet.intersect(part.assignT(tx, tid).toSet)
      assert(common.size == 1,
        s"joining pair ($sid,$tid) co-located in ${common.size} partitions: $common")
      val pp = part.pairPartition(sx, sid, tx, tid)
      assert(common.head == pp,
        s"pairPartition=$pp but co-location is ${common.head}")
    }
  }

  def checkMultiplicities(part: BandPartitioning,
                          s: Seq[(Long, Array[Double])],
                          t: Seq[(Long, Array[Double])]): Unit = {
    for ((id, x) <- s)
      assert(part.sMultiplicity(x, id) == part.assignS(x, id).length)
    for ((id, x) <- t)
      assert(part.tMultiplicity(x, id) == part.assignT(x, id).length)
  }

  def checkAll(part: BandPartitioning, band: BandSpec,
               s: Seq[(Long, Array[Double])],
               t: Seq[(Long, Array[Double])]): Unit = {
    checkAssignmentsNonEmpty(part, s, t)
    checkExactlyOnce(part, band, s, t)
    checkMultiplicities(part, s, t)
  }

  /** Deterministic pseudo-random point cloud for property checks. */
  def cloud(n: Int, d: Int, seed: Long, lo: Double = 0.0, hi: Double = 10.0,
            skewed: Boolean = false): Seq[(Long, Array[Double])] = {
    val rnd = new scala.util.Random(seed)
    (0 until n).map { i =>
      val x = Array.fill(d) {
        val u = rnd.nextDouble()
        val v = if (skewed) u * u * u else u
        lo + v * (hi - lo)
      }
      (i.toLong, x)
    }
  }
}
