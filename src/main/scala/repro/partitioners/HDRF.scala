package repro.partitioners

import repro.core.Edge

/** HDRF (High-Degree Replicated First, Petroni et al., CIKM'15).
  *
  * Streaming scoring partitioner: each edge goes to the partition maximizing
  * C_rep + λ·C_bal, where C_rep favors partitions already holding the
  * endpoint with the higher (partial) degree and C_bal the lighter
  * partitions. O(k) per edge — the scalability weakness Figure 6 shows.
  *
  * @param lambda balance weight (paper default 1.1 in this line of work)
  */
final case class HDRF(lambda: Double = 1.1) extends EdgePartitioner {
  override def name: String = "HDRF"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val replicas = new ReplicaTable(k)
      val partialDeg = new java.util.HashMap[Long, Int]()
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)
      val eps = 1e-3

      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val du = partialDeg.merge(e.src, 1, _ + _).toDouble
        val dv = partialDeg.merge(e.dst, 1, _ + _).toDouble
        val thetaU = du / (du + dv)
        val thetaV = 1.0 - thetaU
        var maxL = Long.MinValue; var minL = Long.MaxValue
        var p = 0
        while (p < k) {
          if (load(p) > maxL) maxL = load(p)
          if (load(p) < minL) minL = load(p)
          p += 1
        }
        val mu = replicas.maskOf(e.src)
        val mv = replicas.maskOf(e.dst)
        var best = -1
        var bestScore = Double.NegativeInfinity
        p = 0
        while (p < k) {
          if (load(p) < ctx.capacity) {
            var cRep = 0.0
            if (replicas.bit(mu, p)) cRep += 1.0 + (1.0 - thetaU)
            if (replicas.bit(mv, p)) cRep += 1.0 + (1.0 - thetaV)
            val cBal = lambda * (maxL - load(p)).toDouble / (eps + (maxL - minL).toDouble)
            val s = cRep + cBal
            if (s > bestScore) { bestScore = s; best = p }
          }
          p += 1
        }
        replicas.add(e.src, best); replicas.add(e.dst, best)
        load(best) += 1
        pids(i) = best
        i += 1
      }
      (pids, replicas.stateBytes + partialDeg.size.toLong * 28L, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
