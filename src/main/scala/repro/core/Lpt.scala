package repro.core

/** Longest-Processing-Time greedy assignment of weighted partitions to
  * workers — the deterministic proxy for the dynamic scheduling the
  * paper's cluster performs at runtime (§4.2: load variance was chosen
  * as a scheduler-independent measure; for reporting Im/Om we still need
  * a concrete assignment).
  */
object Lpt {

  /** Assign `loads(i)` to one of `w` workers; returns worker index per
    * partition. Partitions are placed heaviest-first on the currently
    * least-loaded worker (ties broken by worker index).
    */
  def assign(loads: Array[Double], w: Int): Array[Int] = {
    require(w >= 1)
    val order = loads.indices.toArray.sortBy(i => (-loads(i), i))
    val workerLoad = Array.fill(w)(0.0)
    val out = new Array[Int](loads.length)
    for (p <- order) {
      var best = 0
      var i = 1
      while (i < w) {
        if (workerLoad(i) < workerLoad(best)) best = i
        i += 1
      }
      out(p) = best
      workerLoad(best) += loads(p)
    }
    out
  }

  /** Max worker load under the LPT assignment. */
  def maxLoad(loads: Array[Double], w: Int): Double = {
    val a = assign(loads, w)
    val workerLoad = Array.fill(w)(0.0)
    for (i <- loads.indices) workerLoad(a(i)) += loads(i)
    if (workerLoad.isEmpty) 0.0 else workerLoad.max
  }
}
