package repro.core

/** A join partitioning in the sense of Definition 1: an assignment of
  * every input tuple to one or more *partitions* such that each output
  * pair can be recovered by exactly one local join.
  *
  * Partitions (not workers) are the unit of local joins — a worker may
  * execute several local joins (e.g., several Grid-ε cells), and joining
  * a worker's tuples across partitions would produce duplicate output.
  * `partitionWorker` maps each partition id to the worker that runs it.
  *
  * `salt` is the tuple's unique id; randomized schemes (1-Bucket rows /
  * columns) derive their "random" choice from it so that assignment is
  * deterministic and reproducible.
  */
trait BandPartitioning extends Serializable {

  /** Number of (logical) workers w. */
  def numWorkers: Int

  /** Partition ids (distinct) that receive an S-tuple at point `x`. */
  def assignS(x: Array[Double], salt: Long): Array[Int]

  /** Partition ids (distinct) that receive a T-tuple at point `x`. */
  def assignT(x: Array[Double], salt: Long): Array[Int]

  /** Worker executing partition `pid`. */
  def partitionWorker(pid: Int): Int

  /** The unique partition in which the joining pair (s, t) is produced.
    * Must be an element of both `assignS(s)` and `assignT(t)`.
    */
  def pairPartition(s: Array[Double], sSalt: Long, t: Array[Double], tSalt: Long): Int

  /** Number of partitions an S-tuple is copied to. Override when it can
    * be computed without enumerating the partitions (Grid-ε in high d).
    */
  def sMultiplicity(x: Array[Double], salt: Long): Int = assignS(x, salt).length

  /** Number of partitions a T-tuple is copied to. */
  def tMultiplicity(x: Array[Double], salt: Long): Int = assignT(x, salt).length
}
