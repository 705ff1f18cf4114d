package repro.games

import repro.core.Edge
import repro.partitioners.{EdgePartitioner, PartitionContext, PartitionResult}

/** RMGP (Armenatzoglou et al., SIGMOD'15) — real-time multi-criteria social
  * graph partitioning via a Nash game, re-implemented (no public code, as in
  * the paper).
  *
  * Every *vertex* is a player; its cost mixes graphical distance (here: the
  * number of neighbors placed elsewhere) and semantic similarity (here: a
  * synthetic vertex attribute — DESIGN.md §4) plus a balance penalty. Best
  * response sweeps iterate to a (vertex-level) equilibrium; the vertex
  * partitioning is then converted to an edge assignment. Holds the full
  * adjacency: the memory cost Table 4 shows.
  *
  * @param maxEdges budget guard reproducing the paper's ">24h" DNF entries
  */
final case class RMGP(maxRounds: Int = 30, maxEdges: Long = 600000L,
                      semanticWeight: Double = 0.3) extends EdgePartitioner {
  override def name: String = "RMGP"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    if (stream.length > maxEdges)
      return PartitionResult(name, Array.empty, 0L, 0L, 0, dnf = true)
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val game = new VertexGame(stream, k)
      // Synthetic semantic attribute per vertex (deterministic).
      val nAttr = 8
      def attr(v: Long): Int = (((repro.core.GenHash.mix(v * 31 + 7) % nAttr) + nAttr) % nAttr).toInt
      val attrCount = Array.ofDim[Long](k, nAttr)
      for (v <- game.vertices) attrCount(game.part(game.idOf(v)))(attr(v)) += 1

      val rounds = game.bestResponseRounds(maxRounds) { (vid, gain, load) =>
        // add the semantic term: prefer partitions dense in this attribute
        val v = game.vertexOf(vid)
        val a = attr(v)
        var p = 0
        while (p < load.length) {
          gain(p) += semanticWeight * attrCount(p)(a) / math.max(1.0, game.n.toDouble / k)
          p += 1
        }
      } { (vid, from, to) =>
        val a = attr(game.vertexOf(vid))
        attrCount(from)(a) -= 1; attrCount(to)(a) += 1
      }
      val pids = game.edgeAssignment(ctx)
      (pids, game.stateBytes + k.toLong * nAttr * 8, rounds)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}

/** Shared vertex-level partitioning game substrate for RMGP and MDSGP:
  * dense-id adjacency, per-vertex best responses on
  * (neighbor affinity − balance penalty), and vertex→edge conversion.
  */
final class VertexGame(stream: IndexedSeq[Edge], k: Int) {
  private val id = new java.util.HashMap[Long, Int]()
  stream.foreach { e =>
    if (!id.containsKey(e.src)) id.put(e.src, id.size)
    if (!id.containsKey(e.dst)) id.put(e.dst, id.size)
  }
  val n: Int = id.size
  private val rev = new Array[Long](n)
  id.forEach((v, i) => rev(i) = v)

  // CSR adjacency.
  private val deg = new Array[Int](n)
  stream.foreach { e => deg(id.get(e.src)) += 1; deg(id.get(e.dst)) += 1 }
  private val off = deg.scanLeft(0)(_ + _)
  private val nbr = new Array[Int](2 * stream.length)
  private val fill = off.clone()
  stream.foreach { e =>
    val a = id.get(e.src); val b = id.get(e.dst)
    nbr(fill(a)) = b; fill(a) += 1
    nbr(fill(b)) = a; fill(b) += 1
  }

  val part: Array[Int] = Array.tabulate(n)(i => i % k)
  private val loads = new Array[Long](k)
  (0 until n).foreach(i => loads(part(i)) += 1)

  def idOf(v: Long): Int = id.get(v)
  def vertexOf(i: Int): Long = rev(i)
  def vertices: Iterator[Long] = rev.iterator
  def stateBytes: Long = nbr.length.toLong * 4 + n.toLong * 12 + id.size.toLong * 28

  /** Best-response sweeps. `boost` lets callers add criteria to the per-
    * partition gain vector; `onMove` observes accepted moves.
    */
  def bestResponseRounds(maxRounds: Int)
                        (boost: (Int, Array[Double], Array[Long]) => Unit)
                        (onMove: (Int, Int, Int) => Unit): Int = {
    val balWeight = 2.0 * stream.length / (k.toDouble * math.max(1, n / k))
    var r = 0
    var changed = true
    while (changed && r < maxRounds) {
      changed = false
      var v = 0
      while (v < n) {
        val gain = new Array[Double](k)
        var j = off(v)
        while (j < off(v + 1)) { gain(part(nbr(j))) += 1.0; j += 1 }
        boost(v, gain, loads)
        var best = part(v)
        var bestScore = gain(best) - balWeight * (loads(best) - 1).toDouble / n
        var p = 0
        while (p < k) {
          val s = gain(p) - balWeight * loads(p).toDouble / n
          if (p != part(v) && s > bestScore + 1e-12) { bestScore = s; best = p }
          p += 1
        }
        if (best != part(v)) {
          loads(part(v)) -= 1; loads(best) += 1
          onMove(v, part(v), best)
          part(v) = best
          changed = true
        }
        v += 1
      }
      r += 1
    }
    r
  }

  /** Vertex partitioning → edge assignment (lesser-loaded endpoint wins),
    * under the shared capacity cap.
    */
  def edgeAssignment(ctx: PartitionContext): Array[Int] = {
    val eLoad = new Array[Long](k)
    val pids = new Array[Int](stream.length)
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      val pu = part(id.get(e.src)); val pv = part(id.get(e.dst))
      var p = if (pu == pv) pu else if (eLoad(pu) <= eLoad(pv)) pu else pv
      if (eLoad(p) >= ctx.capacity) {
        val alt = if (p == pu) pv else pu
        p = if (eLoad(alt) < ctx.capacity) alt
            else { var best = 0; var q = 1; while (q < k) { if (eLoad(q) < eLoad(best)) best = q; q += 1 }; best }
      }
      eLoad(p) += 1; pids(i) = p
      i += 1
    }
    pids
  }
}
