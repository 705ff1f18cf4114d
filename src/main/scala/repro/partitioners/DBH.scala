package repro.partitioners

import repro.core.{Edge, GenHash}

/** Degree-Based Hashing (Xie et al., NeurIPS'14).
  *
  * Hash the endpoint with the smaller (streaming partial) degree — cutting
  * low-degree vertices is cheap, so the high-degree endpoint keeps locality.
  * O(1) per edge; fastest, weakest-quality baseline.
  */
final case class DBH() extends EdgePartitioner {
  override def name: String = "DBH"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val partialDeg = new java.util.HashMap[Long, Int]()
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)

      def hashTo(v: Long): Int = (((GenHash.mix(v) % k) + k) % k).toInt

      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val du = partialDeg.merge(e.src, 1, _ + _)
        val dv = partialDeg.merge(e.dst, 1, _ + _)
        val lesser = if (du < dv || (du == dv && e.src <= e.dst)) e.src else e.dst
        var p = hashTo(lesser)
        if (load(p) >= ctx.capacity) {
          p = hashTo(if (lesser == e.src) e.dst else e.src)
          if (load(p) >= ctx.capacity) {
            // Spill to the least-loaded partition under the cap.
            var best = 0; var q = 1
            while (q < k) { if (load(q) < load(best)) best = q; q += 1 }
            p = best
          }
        }
        load(p) += 1
        pids(i) = p
        i += 1
      }
      (pids, partialDeg.size.toLong * 28L, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
