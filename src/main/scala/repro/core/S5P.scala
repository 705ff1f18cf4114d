package repro.core

import repro.partitioners.{EdgePartitioner, PartitionContext, PartitionResult}

/** The Skewness-aware Vertex-cut Partitioner (the paper's contribution):
  * skewness-aware streaming clustering (Alg. 1) → two-stage Stackelberg
  * game (Alg. 2) → capacity-constrained postprocessing (Alg. 3).
  *
  * @param beta      head/tail threshold coefficient (ξ = β·2|E|/|V|), paper
  *                  default 1
  * @param tau       balance threshold for the postprocessing cap L, paper
  *                  default 1.0
  * @param useCms    Θ via Count-Min Sketch (paper default) vs exact map
  * @param twoStage  two-stage Stackelberg vs one-stage pool (ablation)
  * @param bounded   S5P-B: global degrees everywhere, κ and L disabled
  *                  (the Theorem 2 variant)
  * @param clusterLevel play the game on clusters (paper default); `false`
  *                  plays it on individual edges (the "w/o clustering"
  *                  ablation of Fig. 7c — quadratic, small graphs only)
  */
final case class S5P(beta: Double = 2.0, tau: Double = 1.0,
                     useCms: Boolean = true, eps: Double = 0.1, nu: Double = 0.01,
                     twoStage: Boolean = true, maxRounds: Int = 50,
                     batchSize: Int = 512, threads: Int = 1,
                     bounded: Boolean = false, clusterLevel: Boolean = true,
                     headWeight: Double = 0.85, kappaScale: Double = 0.5,
                     label: String = "S5P") extends EdgePartitioner {

  override def name: String = if (bounded) "S5P-B" else label

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      if (!clusterLevel) partitionEdgeLevel(stream, ctx)
      else {
        val stats = ctx.stats
        // Phase 1 — clustering.
        val clustering = SkewClustering.cluster(
          stream, stats, ctx.k, beta,
          kappaOverride =
            if (bounded) Some(Double.PositiveInfinity)
            else if (kappaScale != 1.0) Some(kappaScale * 2.0 * stats.numEdges / ctx.k)
            else None,
          globalTail = bounded)
        // Phase 2 — Stackelberg game over clusters.
        val input = GameInput.build(stream, stats, clustering, useCms, eps, nu)
        // Phase 3's capacity also informs the game's load clamping.
        val capacity =
          if (bounded) Long.MaxValue
          else math.ceil(tau * stats.numEdges / ctx.k.toDouble).toLong
        val game = StackelbergGame.solve(input, ctx.k,
          StackelbergGame.Config(twoStage, maxRounds, batchSize, threads,
            capacity = if (bounded) Double.PositiveInfinity else capacity.toDouble))
        val nH = input.numHead
        val pids = Postprocess.assign(
          stream, ctx.k, capacity,
          e => SkewClustering.isHeadEdge(e, stats, clustering.xi),
          (e, head) =>
            if (head)
              (game.c2p(input.headIdOf.get(clustering.v2cH.get(e.src))),
               game.c2p(input.headIdOf.get(clustering.v2cH.get(e.dst))))
            else
              (game.c2p(nH + input.tailIdOf.get(clustering.v2cT.get(e.src))),
               game.c2p(nH + input.tailIdOf.get(clustering.v2cT.get(e.dst)))),
          degree = stats.degree, xi = clustering.xi, headWeight = headWeight)
        (pids, clustering.stateBytes + game.stateBytes, game.rounds)
      }
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }

  /** Fig. 7c ablation: every edge is its own player. The game state is the
    * edge-level analog of GameInput (players = edges, Θ = shared vertices).
    */
  private def partitionEdgeLevel(stream: IndexedSeq[Edge], ctx: PartitionContext): (Array[Int], Long, Int) = {
    val n = stream.length
    require(n <= 200000, "edge-level game is quadratic; ablation is small-scale only")
    // Neighbors: edges sharing a vertex. Build via vertex → incident edges.
    val incident = new java.util.HashMap[Long, java.util.ArrayList[Int]]()
    for (i <- 0 until n) {
      val e = stream(i)
      incident.computeIfAbsent(e.src, _ => new java.util.ArrayList[Int]()).add(i)
      incident.computeIfAbsent(e.dst, _ => new java.util.ArrayList[Int]()).add(i)
    }
    val nbrSets = Array.fill(n)(new java.util.HashSet[Int]())
    incident.values().forEach { lst =>
      var a = 0
      while (a < lst.size()) {
        var b = a + 1
        while (b < lst.size()) {
          nbrSets(lst.get(a)).add(lst.get(b)); nbrSets(lst.get(b)).add(lst.get(a))
          b += 1
        }
        a += 1
      }
    }
    val nbrs = nbrSets.map { s =>
      val a = new Array[Int](s.size); var j = 0; val it = s.iterator()
      while (it.hasNext) { a(j) = it.next(); j += 1 }
      a
    }
    val size = Array.fill(n)(1.0)
    val in = new GameInput(0, n, size, nbrs, (_, _) => 1L, 0L,
      new java.util.HashMap(), new java.util.HashMap())
    val game = StackelbergGame.solve(in, ctx.k,
      StackelbergGame.Config(twoStage = false, maxRounds, batchSize, threads))
    (game.c2p, in.stateBytes, game.rounds)
  }
}
