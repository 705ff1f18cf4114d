package repro.partitioners

import repro.core.Edge

/** HEP — Hybrid Edge Partitioner (Mayer & Jacobsen, SIGMOD'21), simplified.
  *
  * Splits the edge set by endpoint degree: edges between low-degree vertices
  * are partitioned in memory with NE-style expansion (high quality), edges
  * touching a high-degree vertex are streamed with HDRF (low memory). The
  * degree threshold trades memory for quality; we use the paper's spirit
  * with threshold = hdfFactor · avg-degree.
  */
final case class HEPLite(hdfFactor: Double = 10.0) extends EdgePartitioner {
  override def name: String = "HEP"

  override def partition(stream: IndexedSeq[Edge], ctx: PartitionContext): PartitionResult = {
    val (pids, ms, bytes, rounds) = timed {
      val stats = ctx.stats
      val threshold = hdfFactor * stats.avgDegree
      val lowIdx = new java.util.ArrayList[Int]()
      val highIdx = new java.util.ArrayList[Int]()
      var i = 0
      while (i < stream.length) {
        val e = stream(i)
        if (stats.degree(e.src) <= threshold && stats.degree(e.dst) <= threshold)
          lowIdx.add(i)
        else highIdx.add(i)
        i += 1
      }
      import scala.jdk.CollectionConverters._
      val lowStream = lowIdx.asScala.map(stream(_)).toIndexedSeq
      val highStream = highIdx.asScala.map(stream(_)).toIndexedSeq

      val pids = new Array[Int](stream.length)
      var stateBytes = 0L
      // Each half gets a context scoped to its own edge count so the two
      // halves' capacity caps sum to the overall cap.
      if (lowStream.nonEmpty) {
        val subCtx = ctx.copy(stats = stats.copy(numEdges = lowStream.length.toLong))
        val r = NE().partition(lowStream, subCtx)
        var j = 0
        while (j < lowStream.length) { pids(lowIdx.get(j)) = r.pids(j); j += 1 }
        stateBytes += r.stateBytes
      }
      if (highStream.nonEmpty) {
        val subCtx = ctx.copy(stats = stats.copy(numEdges = highStream.length.toLong))
        val r = HDRF().partition(highStream, subCtx)
        var j = 0
        while (j < highStream.length) { pids(highIdx.get(j)) = r.pids(j); j += 1 }
        stateBytes += r.stateBytes
      }
      (pids, stateBytes, 0)
    }
    PartitionResult(name, pids, ms, bytes, rounds)
  }
}
