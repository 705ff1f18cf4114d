package repro

import repro.core.{Edge, GraphOps, GraphStats}
import repro.gen.GraphGen
import repro.partitioners.PartitionContext

/** Shared fixtures: small graphs + driver-side stats (tests avoid repeated
  * Spark scans; Spark-vs-driver stat agreement is itself tested once).
  */
object TestGraphs {

  /** Driver-side stats, bit-identical to GraphOps.stats (tested). */
  def localStats(stream: IndexedSeq[Edge]): GraphStats = {
    val m = new java.util.HashMap[Long, Int]()
    stream.foreach { e =>
      m.merge(e.src, 1, _ + _)
      m.merge(e.dst, 1, _ + _)
    }
    GraphStats(m.size.toLong, stream.length.toLong, m)
  }

  def ctx(stream: IndexedSeq[Edge], k: Int, tau: Double = 1.05): PartitionContext =
    PartitionContext(k, localStats(stream), tau)

  lazy val toy: IndexedSeq[Edge] = GraphGen.toyGraph
  lazy val rmatSmall: IndexedSeq[Edge] = GraphGen.rmat(500, 5000, seed = 1)
  lazy val communitySmall: IndexedSeq[Edge] = GraphGen.community(600, 6000, seed = 2)
  lazy val rmatTiny: IndexedSeq[Edge] = GraphGen.rmat(60, 300, seed = 3)
  lazy val commTiny: IndexedSeq[Edge] = GraphGen.community(80, 400, seed = 4)
}
