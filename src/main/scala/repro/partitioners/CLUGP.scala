package repro.partitioners

import repro.core.{Edge, GameInput, Postprocess, SkewClustering, StackelbergGame}

/** CLUGP (Kong, Xie, Zhang — ICDE'22): clustering-based partitioning with a
  * post-clustering *static* (simultaneous-move) game.
  *
  * Re-implemented on the same substrate as S5P, with the two differences the
  * paper calls out: (1) the clustering is local-degree with a splitting
  * operation and no head/tail distinction (Table 1); (2) the game is a
  * one-stage pool of undifferentiated cluster players rather than a
  * two-stage Stackelberg hierarchy.
  */
final case class CLUGP(tau: Double = 1.0, useCms: Boolean = true,
                       maxRounds: Int = 50) extends EdgePartitioner {
  override def name: String = "CLUGP"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val stats = ctx.stats
      val v2c = SkewClustering.genericCluster(stream, stats, ctx.k,
        globalDegrees = false, splitting = true)
      val input = GameInput.buildSingle(stream, v2c, useCms)
      val capacity = math.ceil(tau * stats.numEdges / ctx.k.toDouble).toLong
      val game = StackelbergGame.solve(input, ctx.k,
        StackelbergGame.Config(twoStage = false, maxRounds = maxRounds,
          capacity = capacity.toDouble))
      val pids = Postprocess.assign(
        stream, ctx.k, capacity,
        _ => false, // no head/tail distinction: every overflow scans backward
        (e, _) => (game.c2p(input.tailIdOf.get(v2c.get(e.src))),
                   game.c2p(input.tailIdOf.get(v2c.get(e.dst)))),
        degree = stats.degree)
      (pids, v2c.size.toLong * 28L + game.stateBytes, game.rounds)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
