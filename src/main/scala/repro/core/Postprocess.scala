package repro.core

import repro.partitioners.ReplicaTable

/** Algorithm 3 — final edge placement under the hard capacity
  * L = ⌈τ·|E|/k⌉.
  *
  * Per §5.2 the postprocessing phase keeps a vertex-to-partition
  * *replication matrix* (O(k|V|)) and the text "queries the current
  * partitions to which vertices u and v belong": the placement is
  * replica-aware, seeded by the game's cluster→partition decisions.
  *
  * Decision for edge e(u,v) with cluster partitions (Pu, Pv):
  *   1. a partition under L already holding replicas of *both* u and v
  *      (no new replica at all) — ties prefer the cluster partitions,
  *      then the larger load (the paper's "add to the partition with a
  *      larger size");
  *   2. else the cluster partition Pu/Pv under L holding one endpoint,
  *      else any replica partition of u or v under L;
  *   3. else the cluster partition (larger load first) under L;
  *   4. else overflow: head edges scan forward from partition 0, tail
  *      edges backward from k−1 (minimizes the spread of each kind).
  */
object Postprocess {

  def assign(stream: IndexedSeq[Edge], k: Int, capacity: Long,
             isHead: Edge => Boolean,
             c2pOfEdge: (Edge, Boolean) => (Int, Int),
             degree: Long => Int = _ => 1,
             xi: Double = Double.PositiveInfinity,
             headWeight: Double = 1.0): Array[Int] = {
    val load = new Array[Long](k)
    val pids = new Array[Int](stream.length)
    val replicas = new ReplicaTable(k)

    def firstWithRoom(forward: Boolean): Int = {
      if (forward) {
        var p = 0
        while (p < k) { if (load(p) < capacity) return p; p += 1 }
      } else {
        var p = k - 1
        while (p >= 0) { if (load(p) < capacity) return p; p -= 1 }
      }
      // With L = ⌈τ|E|/k⌉ and τ ≥ 1 this is unreachable: k·L ≥ |E|.
      throw new IllegalStateException("no partition has room — capacity too small")
    }

    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      val head = isHead(e)
      val (pu, pv) = c2pOfEdge(e, head)

      // Candidate partitions: replica sets of both endpoints + the two
      // cluster partitions. HDRF-style degree-weighted replica score (the
      // lower-degree endpoint is the expensive one to replicate), a bonus
      // for the game's cluster partitions, and a light balance term.
      val du = degree(e.src).toDouble
      val dv = degree(e.dst).toDouble
      val thetaU = du / (du + dv)
      // Skewness-aware weighting (§4.3): a head endpoint is replicated
      // across partitions anyway, so its presence should not pull the edge
      // as strongly as a tail endpoint whose locality is still intact.
      val wu = if (du > xi) headWeight else 1.0
      val wv = if (dv > xi) headWeight else 1.0
      var best = -1
      var bestScore = Double.NegativeInfinity
      def consider(p: Int): Unit = {
        if (p >= 0 && load(p) < capacity) {
          var s = 0.0
          val hasU = replicas.contains(e.src, p)
          val hasV = replicas.contains(e.dst, p)
          if (hasU) s += wu * (1.0 + (1.0 - thetaU))
          if (hasV) s += wv * (1.0 + thetaU)
          // Intersection super-bonus (PowerGraph's rule 1): a partition
          // already holding both endpoints creates no replica at all.
          if (hasU && hasV) s += 1.0
          if (p == pu || p == pv) s += 0.5
          s += 0.2 * (1.0 - load(p).toDouble / math.max(1L, capacity))
          if (s > bestScore) { bestScore = s; best = p }
        }
      }
      consider(pu); consider(pv)
      replicas.forEachPartition(e.src)(consider)
      replicas.forEachPartition(e.dst)(consider)
      if (bestScore < 1.0) {
        // No replica hit: also consider the least-loaded partition, so
        // fresh regions spread out instead of piling on full clusters.
        var q = 0; var least = 0
        while (q < k) { if (load(q) < load(least)) least = q; q += 1 }
        consider(least)
      }
      val p = if (best >= 0) best else firstWithRoom(head)

      pids(i) = p
      load(p) += 1
      replicas.add(e.src, p); replicas.add(e.dst, p)
      i += 1
    }
    pids
  }
}
