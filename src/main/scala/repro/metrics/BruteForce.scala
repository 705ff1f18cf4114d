package repro.metrics

import repro.core.Edge

/** Exact minimum-replication-factor edge partitioning for tiny graphs
  * (Table 5's "Opt." column). Branch-and-bound over the k^|E| assignment
  * space with partition-symmetry breaking, a per-partition capacity cap
  * (the same L = ⌈|E|/k⌉ the heuristics obey), and an admissible lower
  * bound on the final replica count.
  */
object BruteForce {

  /** @return (optimal RF, one optimal assignment) */
  def minReplicationFactor(stream: IndexedSeq[Edge], k: Int,
                           tau: Double = 1.0): (Double, Array[Int]) = {
    val m = stream.length
    require(m <= 24, s"brute force is exponential; got $m edges")
    val cap = math.ceil(tau * m / k.toDouble).toLong

    // Dense vertex ids.
    val id = collection.mutable.LinkedHashMap.empty[Long, Int]
    stream.foreach { e =>
      id.getOrElseUpdate(e.src, id.size); id.getOrElseUpdate(e.dst, id.size)
    }
    val nv = id.size
    val es = stream.map(e => (id(e.src), id(e.dst))).toArray

    val partsOf = Array.fill(nv)(0L) // bitmask over partitions (k ≤ 64)
    require(k <= 64, "bitmask bound")
    val load = new Array[Long](k)
    val assign = new Array[Int](m)
    var bestReplicas = Long.MaxValue
    var bestAssign: Array[Int] = null

    // Admissible LB: replicas already committed by closed vertices plus ≥1
    // replica for every vertex still open or unseen.
    def lowerBound(i: Int, committed: Long, openOrUnseen: Int): Long =
      committed + openOrUnseen

    def dfs(i: Int, committed: Long, openOrUnseen: Int, usedParts: Int): Unit = {
      if (lowerBound(i, committed, openOrUnseen) >= bestReplicas) return
      if (i == m) {
        bestReplicas = committed
        bestAssign = assign.clone()
        return
      }
      val (u, v) = es(i)
      // Symmetry breaking: allow at most one previously-unused partition.
      val limit = math.min(k - 1, usedParts)
      var p = 0
      while (p <= limit) {
        if (load(p) < cap) {
          val bu = partsOf(u); val bv = partsOf(v)
          val newU = (bu & (1L << p)) == 0
          val newV = (bv & (1L << p)) == 0
          var dCommitted = 0L
          var dOpen = 0
          if (newU) { partsOf(u) |= 1L << p; dCommitted += 1 }
          if (newV) { partsOf(v) |= 1L << p; dCommitted += 1 }
          // A vertex "closes" at its last edge: its replicas become final.
          // Vertices first seen here stop being "unseen".
          if (newU && java.lang.Long.bitCount(bu) == 0) dOpen -= 1
          if (newV && java.lang.Long.bitCount(bv) == 0) dOpen -= 1
          load(p) += 1
          assign(i) = p
          dfs(i + 1, committed + dCommitted, openOrUnseen + dOpen,
              if (p == usedParts) usedParts + 1 else usedParts)
          load(p) -= 1
          if (newU) partsOf(u) &= ~(1L << p)
          if (newV) partsOf(v) &= ~(1L << p)
        }
        p += 1
      }
    }

    dfs(0, 0L, nv, 0)
    (bestReplicas.toDouble / nv, bestAssign)
  }
}
