package repro.partitioners

import repro.core.{Edge, GenHash}

/** Grid partitioning (GraphBuilder, Jain et al. 2013).
  *
  * Partitions are arranged in an r×c grid (r·c = k); a vertex hashes to one
  * cell and its constraint set is that cell's row ∪ column. An edge goes to
  * the least-loaded partition in the intersection of its endpoints'
  * constraint sets (non-empty for a square-ish grid).
  */
final case class GridPartitioner() extends EdgePartitioner {
  override def name: String = "Grid"

  /** Factor k = r·c with r ≤ c and r maximal (square-most grid). */
  private[partitioners] def dims(k: Int): (Int, Int) = {
    var r = math.sqrt(k.toDouble).toInt
    while (k % r != 0) r -= 1
    (r, k / r)
  }

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val (r, c) = dims(k)
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)

      def cell(v: Long): Int = (((GenHash.mix(v) % k) + k) % k).toInt
      /** Constraint set: the row and column through the vertex's cell. */
      def constraintSet(v: Long): Array[Int] = {
        val cl = cell(v)
        val row = cl / c; val col = cl % c
        val set = new java.util.LinkedHashSet[Integer]()
        var j = 0
        while (j < c) { set.add(row * c + j); j += 1 }
        j = 0
        while (j < r) { set.add(j * c + col); j += 1 }
        val out = new Array[Int](set.size)
        var i = 0; val it = set.iterator()
        while (it.hasNext) { out(i) = it.next(); i += 1 }
        out
      }

      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val su = constraintSet(e.src)
        val sv = constraintSet(e.dst).toSet
        var best = -1
        var j = 0
        while (j < su.length) {
          val p = su(j)
          if (sv.contains(p) && load(p) < ctx.capacity && (best == -1 || load(p) < load(best)))
            best = p
          j += 1
        }
        if (best == -1) {
          // Intersection empty (non-square grid) or saturated: least-loaded.
          var q = 0
          while (q < k) { if (best == -1 || load(q) < load(best)) best = q; q += 1 }
        }
        load(best) += 1
        pids(i) = best
        i += 1
      }
      (pids, 0L, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
