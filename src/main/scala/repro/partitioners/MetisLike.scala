package repro.partitioners

import repro.core.Edge

/** A METIS-style multilevel *edge-cut* partitioner (Karypis & Kumar),
  * simplified: heavy-edge-matching coarsening, greedy balanced k-way initial
  * partitioning on the coarse graph, and one boundary-refinement sweep per
  * level while uncoarsening. The resulting vertex partitioning is converted
  * to an edge assignment (each edge goes to one endpoint's partition), so
  * RF is comparable with the vertex-cut methods, as in the paper's Figure 6.
  *
  * Offline: holds the full (coarsened) graph in memory.
  */
final case class MetisLike(coarsestSize: Int = 512) extends EdgePartitioner {
  override def name: String = "METIS"

  private final case class CoarseGraph(n: Int, vwgt: Array[Long],
                                       adj: Array[Array[Int]], w: Array[Array[Long]])

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      // Dense vertex ids.
      val id = new java.util.HashMap[Long, Int]()
      stream.foreach { e =>
        if (!id.containsKey(e.src)) id.put(e.src, id.size)
        if (!id.containsKey(e.dst)) id.put(e.dst, id.size)
      }
      val n0 = id.size
      // Weighted adjacency (merge parallel edges).
      def buildAdj(n: Int, edges: Iterator[(Int, Int, Long)]): (Array[Array[Int]], Array[Array[Long]]) = {
        val maps = Array.fill(n)(new java.util.HashMap[Integer, java.lang.Long]())
        edges.foreach { case (a, b, wt) =>
          if (a != b) {
            maps(a).merge(b, wt, (x, y) => x + y)
            maps(b).merge(a, wt, (x, y) => x + y)
          }
        }
        val adj = new Array[Array[Int]](n)
        val w = new Array[Array[Long]](n)
        var i = 0
        while (i < n) {
          val m = maps(i)
          adj(i) = new Array[Int](m.size); w(i) = new Array[Long](m.size)
          var j = 0
          val it = m.entrySet().iterator()
          while (it.hasNext) { val en = it.next(); adj(i)(j) = en.getKey; w(i)(j) = en.getValue; j += 1 }
          i += 1
        }
        (adj, w)
      }
      val (adj0, w0) = buildAdj(n0, stream.iterator.map(e => (id.get(e.src), id.get(e.dst), 1L)))
      var levels = List(CoarseGraph(n0, Array.fill(n0)(1L), adj0, w0))
      var maps = List.empty[Array[Int]] // fine-vertex → coarse-vertex per level

      // ---- coarsening: heavy-edge matching until the graph is small or
      // matching stalls (no pair can be merged) ----
      var stalled = false
      while (!stalled && levels.head.n > math.max(coarsestSize, 4 * k)) {
        val g = levels.head
        val matchTo = Array.fill(g.n)(-1)
        val order = (0 until g.n).sortBy(v => g.adj(v).length)
        for (v <- order if matchTo(v) == -1) {
          var best = -1; var bw = -1L
          var j = 0
          while (j < g.adj(v).length) {
            val u = g.adj(v)(j)
            if (matchTo(u) == -1 && u != v && g.w(v)(j) > bw) { bw = g.w(v)(j); best = u }
            j += 1
          }
          if (best >= 0) { matchTo(v) = best; matchTo(best) = v } else matchTo(v) = v
        }
        val cid = Array.fill(g.n)(-1)
        var nc = 0
        for (v <- 0 until g.n if cid(v) == -1) {
          cid(v) = nc; if (matchTo(v) != v) cid(matchTo(v)) = nc; nc += 1
        }
        if (nc >= g.n) stalled = true
        else {
          val vwgt = new Array[Long](nc)
          for (v <- 0 until g.n) vwgt(cid(v)) += g.vwgt(v)
          val coarseEdges = for {
            v <- (0 until g.n).iterator
            j <- g.adj(v).indices.iterator
            if v < g.adj(v)(j)
          } yield (cid(v), cid(g.adj(v)(j)), g.w(v)(j))
          val (ca, cw) = buildAdj(nc, coarseEdges)
          levels ::= CoarseGraph(nc, vwgt, ca, cw)
          maps ::= cid
        }
      }
      // ---- initial partitioning on coarsest graph: greedy balanced ----
      val gC = levels.head
      var part = greedyKway(gC, k)
      // ---- uncoarsen + refine ----
      var lvls = levels.tail
      var mps = maps
      while (mps.nonEmpty) {
        val fine = lvls.head
        val cid = mps.head
        val finePart = new Array[Int](fine.n)
        var v = 0
        while (v < fine.n) { finePart(v) = part(cid(v)); v += 1 }
        refine(fine, finePart, k)
        part = finePart
        lvls = lvls.tail
        mps = mps.tail
      }
      // ---- vertex partition → edge assignment under the cap ----
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)
      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val pu = part(id.get(e.src)); val pv = part(id.get(e.dst))
        var p = if (pu == pv) pu else if (load(pu) <= load(pv)) pu else pv
        if (load(p) >= ctx.capacity) {
          val alt = if (p == pu) pv else pu
          p = if (load(alt) < ctx.capacity) alt
              else { var best = 0; var q = 1; while (q < k) { if (load(q) < load(best)) best = q; q += 1 }; best }
        }
        load(p) += 1; pids(i) = p
        i += 1
      }
      (pids, n0.toLong * 48L + stream.length.toLong * 16L, levels.length)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }

  private def greedyKway(g: CoarseGraph, k: Int): Array[Int] = {
    val part = Array.fill(g.n)(-1)
    val load = new Array[Long](k)
    val totalW = g.vwgt.sum
    val cap = math.ceil(1.1 * totalW / k).toLong
    // Assign in decreasing weight; prefer the partition with the strongest
    // connection, subject to the vertex-weight cap.
    val order = (0 until g.n).sortBy(v => -g.vwgt(v))
    for (v <- order) {
      val gain = new Array[Long](k)
      var j = 0
      while (j < g.adj(v).length) {
        val u = g.adj(v)(j)
        if (part(u) >= 0) gain(part(u)) += g.w(v)(j)
        j += 1
      }
      var best = -1
      var p = 0
      while (p < k) {
        if (load(p) + g.vwgt(v) <= cap &&
            (best == -1 || gain(p) > gain(best) ||
             (gain(p) == gain(best) && load(p) < load(best)))) best = p
        p += 1
      }
      if (best == -1) { best = 0; p = 1; while (p < k) { if (load(p) < load(best)) best = p; p += 1 } }
      part(v) = best; load(best) += g.vwgt(v)
    }
    part
  }

  /** One boundary sweep: move a vertex to its max-gain partition if balance allows. */
  private def refine(g: CoarseGraph, part: Array[Int], k: Int): Unit = {
    val load = new Array[Long](k)
    for (v <- 0 until g.n) load(part(v)) += g.vwgt(v)
    val cap = math.ceil(1.1 * g.vwgt.sum / k.toDouble).toLong
    var v = 0
    while (v < g.n) {
      val gain = new Array[Long](k)
      var j = 0
      while (j < g.adj(v).length) { gain(part(g.adj(v)(j))) += g.w(v)(j); j += 1 }
      var best = part(v)
      var p = 0
      while (p < k) {
        if (p != part(v) && load(p) + g.vwgt(v) <= cap && gain(p) > gain(best)) best = p
        p += 1
      }
      if (best != part(v)) {
        load(part(v)) -= g.vwgt(v); load(best) += g.vwgt(v); part(v) = best
      }
      v += 1
    }
  }
}
