package repro.partitioners

import repro.core.Edge

/** PowerGraph's greedy vertex-cut heuristic (Gonzalez et al., OSDI'12).
  *
  * Case analysis on the replica sets A(u), A(v):
  *   1. A(u) ∩ A(v) ≠ ∅ → least-loaded common partition;
  *   2. both non-empty but disjoint → least-loaded partition of the
  *      endpoint with the higher remaining degree (we use the union,
  *      least-loaded, the standard re-statement);
  *   3. one non-empty → least-loaded partition in it;
  *   4. both new → least-loaded partition overall.
  * All candidates are filtered by the shared capacity cap.
  */
final case class GreedyPG() extends EdgePartitioner {
  override def name: String = "Greedy"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val k = ctx.k
      val replicas = new ReplicaTable(k)
      val load = new Array[Long](k)
      val pids = new Array[Int](stream.length)

      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        val mu = replicas.maskOf(e.src)
        val mv = replicas.maskOf(e.dst)
        // One pass: least-loaded under the cap within each candidate class.
        var both = -1; var either = -1; var any = -1
        var p = 0
        while (p < k) {
          if (load(p) < ctx.capacity) {
            val bu = replicas.bit(mu, p); val bv = replicas.bit(mv, p)
            if (bu && bv && (both == -1 || load(p) < load(both))) both = p
            if ((bu || bv) && (either == -1 || load(p) < load(either))) either = p
            if (any == -1 || load(p) < load(any)) any = p
          }
          p += 1
        }
        val best = if (both >= 0) both else if (either >= 0) either else any
        replicas.add(e.src, best); replicas.add(e.dst, best)
        load(best) += 1
        pids(i) = best
        i += 1
      }
      (pids, replicas.stateBytes, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
