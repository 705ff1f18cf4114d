package repro.partitioners

import repro.core.{Edge, GraphStats}

/** Shared context for a partitioning run.
  *
  * @param k     number of partitions
  * @param stats precomputed graph statistics (Spark-side degree pass)
  * @param tau   load-imbalance threshold τ: no partition may exceed
  *              ⌈τ·|E|/k⌉ edges (the paper runs every streaming method
  *              "within the same load balance constraints")
  */
final case class PartitionContext(k: Int, stats: GraphStats, tau: Double = 1.05) {
  val capacity: Long = math.ceil(tau * stats.numEdges / k.toDouble).toLong
}

/** Result of a partitioning run.
  *
  * @param pids       partition of each edge, aligned with stream order
  * @param timeMs     wall-clock of the partitioning kernel
  * @param stateBytes accounted state footprint of the algorithm (tables,
  *                   sketches, retained adjacency) — the Table 4 memory
  *                   column (DESIGN.md §4)
  * @param rounds     game/refinement rounds, when applicable
  * @param dnf        true when the run was aborted by a budget guard
  *                   (reproduces the paper's ">24h" entries)
  */
final case class PartitionResult(name: String, pids: Array[Int], timeMs: Long,
                                 stateBytes: Long, rounds: Int = 0,
                                 dnf: Boolean = false)

/** A streaming (or offline) vertex-cut edge partitioner. Implementations
  * must assign every edge of the stream to exactly one partition in
  * [0, ctx.k) and respect ctx.capacity.
  */
trait EdgePartitioner {
  def name: String
  def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult

  /** Convenience: run and time the kernel. */
  protected def timed[A](body: => (Array[Int], Long, Int)): (Array[Int], Long, Long, Int) = {
    val t0 = System.nanoTime()
    val (pids, bytes, rounds) = body
    ((pids, (System.nanoTime() - t0) / 1000000L, bytes, rounds))
  }
}

/** Per-vertex replica sets as fixed-width bitmasks — O(|V|·k/64) words. */
final class ReplicaTable(k: Int) {
  private val words = (k + 63) / 64
  private val m = new java.util.HashMap[Long, Array[Long]]()

  def contains(v: Long, p: Int): Boolean = {
    val a = m.get(v)
    a != null && (a(p >> 6) & (1L << (p & 63))) != 0
  }
  /** Raw bitmask of v (null if absent) — hoist out of per-partition loops. */
  def maskOf(v: Long): Array[Long] = m.get(v)
  @inline def bit(a: Array[Long], p: Int): Boolean =
    a != null && (a(p >> 6) & (1L << (p & 63))) != 0
  def add(v: Long, p: Int): Unit = {
    var a = m.get(v)
    if (a == null) { a = new Array[Long](words); m.put(v, a) }
    a(p >> 6) |= (1L << (p & 63))
  }
  def count(v: Long): Int = {
    val a = m.get(v)
    if (a == null) 0 else { var s = 0; var i = 0; while (i < words) { s += java.lang.Long.bitCount(a(i)); i += 1 }; s }
  }
  def partitionsOf(v: Long): Seq[Int] =
    (0 until k).filter(contains(v, _))
  /** Visit the set partitions of v in O(words + |P(v)|). */
  def forEachPartition(v: Long)(f: Int => Unit): Unit = {
    val a = m.get(v)
    if (a != null) {
      var w = 0
      while (w < words) {
        var bits = a(w)
        while (bits != 0) {
          val b = java.lang.Long.numberOfTrailingZeros(bits)
          f(w * 64 + b)
          bits &= bits - 1
        }
        w += 1
      }
    }
  }
  def numVertices: Int = m.size
  def stateBytes: Long = m.size.toLong * (words * 8L + 16L)
}
