package repro.partitioners

import repro.core.Edge

/** NE — Neighborhood Expansion (Zhang et al., KDD'17), offline vertex-cut.
  *
  * Grows one partition at a time from a seed vertex: repeatedly pull the
  * boundary vertex with the fewest external neighbors into the core and
  * allocate its still-unassigned edges, until the partition reaches
  * |E|/k. Loads the full adjacency — the offline memory cost Figure 6
  * attributes to this family.
  */
final case class NE() extends EdgePartitioner {
  override def name: String = "NE"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val n = stream.length
      // Full adjacency: vertex → incident edge indices.
      val adj = new java.util.HashMap[Long, java.util.ArrayList[Int]]()
      var i = 0
      while (i < n) {
        val e = stream(i)
        adj.computeIfAbsent(e.src, _ => new java.util.ArrayList[Int]()).add(i)
        adj.computeIfAbsent(e.dst, _ => new java.util.ArrayList[Int]()).add(i)
        i += 1
      }
      val pids = Array.fill(n)(-1)
      val target = math.max(1L, stream.length / k)
      val assignedV = new java.util.HashSet[Long]()

      def unassignedDegree(v: Long): Int = {
        var c = 0
        val lst = adj.get(v)
        var j = 0
        while (j < lst.size()) { if (pids(lst.get(j)) == -1) c += 1; j += 1 }
        c
      }

      var p = 0
      var cursor = 0 // scan for seed vertices in stream order
      var placed = 0L
      while (p < k - 1 && placed < n) {
        var count = 0L
        val boundary = new java.util.PriorityQueue[(Int, Long)](
          (a, b) => Integer.compare(a._1, b._1))
        // Seed: first vertex with unassigned edges and minimal degree locally.
        var seed = -1L
        while (seed == -1L && cursor < n) {
          val e = stream(cursor)
          if (pids(cursor) == -1) seed = e.src else cursor += 1
        }
        if (seed != -1L) {
          boundary.add((unassignedDegree(seed), seed))
          val inCore = new java.util.HashSet[Long]()
          while (count < target && !boundary.isEmpty) {
            val (_, x) = boundary.poll()
            if (!inCore.contains(x)) {
              inCore.add(x); assignedV.add(x)
              val lst = adj.get(x)
              var j = 0
              while (j < lst.size() && count < target) {
                val ei = lst.get(j)
                if (pids(ei) == -1) {
                  pids(ei) = p; count += 1; placed += 1
                  val e2 = stream(ei)
                  val other = if (e2.src == x) e2.dst else e2.src
                  if (!inCore.contains(other))
                    boundary.add((unassignedDegree(other), other))
                }
                j += 1
              }
            }
          }
        }
        p += 1
      }
      // Remaining edges fill the last partitions, least-loaded under the cap.
      val load = new Array[Long](k)
      i = 0
      while (i < n) { if (pids(i) >= 0) load(pids(i)) += 1; i += 1 }
      i = 0
      while (i < n) {
        if (pids(i) == -1) {
          var best = k - 1; var q = 0
          while (q < k) { if (load(q) < load(best)) best = q; q += 1 }
          pids(i) = best; load(best) += 1
        }
        i += 1
      }
      (pids, stream.length.toLong * 12L + adj.size.toLong * 40L, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
