package repro.games

import repro.core.Edge
import repro.partitioners.{EdgePartitioner, PartitionContext, PartitionResult}

/** MDSGP (Sun et al., TCSS'22) — streaming edge-cut partitioning via a
  * multiplayer *repeated* game over sliding windows, re-implemented (no
  * public code).
  *
  * The stream is cut into r windows; within each window the window's
  * vertices repeatedly best-respond (cohesion + equilibrium terms) against
  * the placement accumulated so far; earlier windows' placements are frozen.
  * The vertex partitioning is converted to an edge assignment. Cost grows
  * with windows × repeated rounds — slower and hungrier than S5P, as in
  * Table 4.
  */
final case class MDSGP(windowSize: Int = 65536, roundsPerWindow: Int = 10)
    extends EdgePartitioner {
  override def name: String = "MDSGP"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val part = new java.util.HashMap[Long, Int]()
      val loads = new Array[Long](k)
      var totalRounds = 0

      // Adjacency accumulated over the prefix seen so far (edge-cut game
      // needs neighbor placements) — the O(|E|) memory of Table 4.
      val adj = new java.util.HashMap[Long, java.util.ArrayList[Long]]()

      var start = 0
      while (start < stream.length) {
        val end = math.min(stream.length, start + windowSize)
        val windowVerts = new java.util.LinkedHashSet[Long]()
        var i = start
        while (i < end) {
          val e = stream(i)
          adj.computeIfAbsent(e.src, _ => new java.util.ArrayList[Long]()).add(e.dst)
          adj.computeIfAbsent(e.dst, _ => new java.util.ArrayList[Long]()).add(e.src)
          windowVerts.add(e.src); windowVerts.add(e.dst)
          i += 1
        }
        // Allocate fresh vertices to the least-loaded partition.
        windowVerts.forEach { v =>
          if (!part.containsKey(v)) {
            var best = 0; var p = 1
            while (p < k) { if (loads(p) < loads(best)) best = p; p += 1 }
            part.put(v, best); loads(best) += 1
          }
        }
        // Repeated game within the window.
        var r = 0
        var changed = true
        val balWeight = 1.0
        while (changed && r < roundsPerWindow) {
          changed = false
          val it = windowVerts.iterator()
          while (it.hasNext) {
            val v = it.next()
            val gain = new Array[Double](k)
            val ns = adj.get(v)
            var j = 0
            while (j < ns.size()) {
              val pw = part.get(ns.get(j))
              if (pw != null) gain(pw) += 1.0
              j += 1
            }
            val cur = part.get(v).intValue()
            var best = cur
            var bestScore = gain(cur) - balWeight * loads(cur).toDouble * k / part.size
            var p = 0
            while (p < k) {
              val s = gain(p) - balWeight * loads(p).toDouble * k / part.size
              if (p != cur && s > bestScore + 1e-12) { bestScore = s; best = p }
              p += 1
            }
            if (best != cur) {
              loads(cur) -= 1; loads(best) += 1; part.put(v, best); changed = true
            }
          }
          r += 1
        }
        totalRounds += r
        start = end
      }

      // Vertex partitioning → edge assignment under the capacity cap.
      val eLoad = new Array[Long](k)
      val pids = new Array[Int](stream.length)
      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val pu = part.get(e.src).intValue(); val pv = part.get(e.dst).intValue()
        var p = if (pu == pv) pu else if (eLoad(pu) <= eLoad(pv)) pu else pv
        if (eLoad(p) >= ctx.capacity) {
          val alt = if (p == pu) pv else pu
          p = if (eLoad(alt) < ctx.capacity) alt
              else { var best = 0; var q = 1; while (q < k) { if (eLoad(q) < eLoad(best)) best = q; q += 1 }; best }
        }
        eLoad(p) += 1; pids(i) = p
        i += 1
      }
      val adjBytes = {
        var s = 0L
        val it = adj.values().iterator()
        while (it.hasNext) s += it.next().size().toLong * 8 + 40
        s
      }
      (pids, adjBytes + part.size.toLong * 28, totalRounds)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
