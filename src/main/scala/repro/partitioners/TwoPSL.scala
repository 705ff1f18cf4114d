package repro.partitioners

import repro.core.{Edge, SkewClustering}

/** 2PS-L (Mayer et al., ICDE'22) — two-phase streaming partitioner with
  * linear run-time.
  *
  * Phase 1: streaming clustering with precomputed *global* degrees as
  * volumes (Table 1's "global migration"). Phase 2: clusters are packed
  * onto partitions (largest-first, least-loaded), then one more pass places
  * each edge on the partition of one of its endpoint clusters — an O(1)
  * decision per edge (its headline linear run-time), with a least-loaded
  * fallback under the capacity cap.
  */
final case class TwoPSL() extends EdgePartitioner {
  override def name: String = "2PS-L"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val stats = ctx.stats
      // Phase 1 — global-degree clustering, no splitting.
      val v2c = SkewClustering.genericCluster(stream, stats, k,
        globalDegrees = true, splitting = false)

      // Cluster → partition packing by edge-volume estimate.
      val volume = new java.util.HashMap[Integer, Long]()
      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        volume.merge(v2c.get(e.src), 1L, _ + _)
        volume.merge(v2c.get(e.dst), 1L, _ + _)
        i += 1
      }
      val packLoad = new Array[Long](k)
      val c2p = new java.util.HashMap[Integer, Integer]()
      val clusters = new java.util.ArrayList[Integer](volume.keySet())
      clusters.sort((a, b) => java.lang.Long.compare(volume.get(b), volume.get(a)))
      clusters.forEach { c =>
        var best = 0; var p = 1
        while (p < k) { if (packLoad(p) < packLoad(best)) best = p; p += 1 }
        c2p.put(c, best); packLoad(best) += volume.get(c)
      }

      // Phase 2 — linear per-edge placement.
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)
      i = 0
      while (i < stream.length) {
        val e = stream(i)
        val pu = c2p.get(v2c.get(e.src)).intValue()
        val pv = c2p.get(v2c.get(e.dst)).intValue()
        var p =
          if (pu == pv) pu
          // Prefer the partition of the lower-degree endpoint's cluster:
          // the high-degree endpoint is cheap to replicate (HDRF intuition).
          else if (stats.degree(e.src) <= stats.degree(e.dst)) pu
          else pv
        if (load(p) >= ctx.capacity) {
          val alt = if (p == pu) pv else pu
          p = if (load(alt) < ctx.capacity) alt
              else {
                var best = 0; var q = 1
                while (q < k) { if (load(q) < load(best)) best = q; q += 1 }
                best
              }
        }
        load(p) += 1
        pids(i) = p
        i += 1
      }
      (pids, v2c.size.toLong * 28L + volume.size.toLong * 24L, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
