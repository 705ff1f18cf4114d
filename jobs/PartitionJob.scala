package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{GraphOps, S5P}
import repro.gas.GasEngine
import repro.gen.GraphGen
import repro.metrics.Metrics
import repro.partitioners.PartitionContext

/** End-to-end Spark job: generate a named graph as a DataFrame, stream it
  * through S5P, attach the assignment, compute RF/balance with Spark, and
  * run GAS PageRank over the partitioned graph.
  *
  * Usage: spark-submit --class repro.jobs.PartitionJob repro.jar [graph] [k]
  */
object PartitionJob {
  def main(args: Array[String]): Unit = {
    val graph = if (args.nonEmpty) args(0) else "UK2"
    val k = if (args.length > 1) args(1).toInt else 32
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"s5p-$graph").getOrCreate()

    val edgesDf = GraphGen.toDf(spark, GraphGen.byName(graph).gen()).cache()
    val stats = GraphOps.stats(edgesDf)
    val stream = GraphOps.collectStream(edgesDf)

    val res = S5P(tau = 1.05).partition(stream, PartitionContext(k, stats, 1.05))
    val assigned = GraphOps.withAssignment(spark, edgesDf, res.pids).cache()

    val rf = Metrics.replicationFactorDf(assigned)
    println(f"graph=$graph k=$k |V|=${stats.numVertices} |E|=${stats.numEdges}")
    println(f"S5P RF=$rf%.4f balance=${Metrics.loadBalance(res.pids, k)}%.4f " +
      f"time=${res.timeMs}ms rounds=${res.rounds} state=${res.stateBytes / 1024}KiB")

    val comm = GasEngine.commStats(assigned, k, rttSeconds = 0.01)
    println(f"GAS PageRank: messages/iter=${comm.messagesPerIter} " +
      f"modelTime=${comm.runtimeModel}%.5fs")
    val ranks = GasEngine.pagerank(spark, assigned, iterations = 5)
    println(f"PageRank mass=${ranks.agg(org.apache.spark.sql.functions.sum("rank")).head.getDouble(0)}%.6f")
    spark.stop()
  }
}
