package repro.jobs

import repro.harness.Tables

/** spark-submit entrypoint for Table 3 (replication factors of the four
  * streaming partitioners at k ∈ {64,128,256}).
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [graph ...]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val graphs =
      if (args.nonEmpty) args.toSeq
      else Seq("OK", "TW", "FR", "LJ", "IT", "UK7", "IN", "SK", "UK2", "AR", "WB")
    println("==== TABLE 3 (Replication Factor; ours vs paper) ====")
    graphs.foreach(g => Tables.table3Graph(g).foreach(println))
  }
}
