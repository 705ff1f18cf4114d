package repro.jobs

import repro.harness.Tables

/** spark-submit entrypoint for Table 4 (game-based methods at k=32).
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [graph ...]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val graphs = if (args.nonEmpty) args.toSeq else Seq("OK", "TW", "FR", "LJ", "WB", "G6")
    println("==== TABLE 4 (Game-based Methods, k=32; ours vs paper) ====")
    graphs.foreach(g => Tables.table4Graph(g).foreach(println))
  }
}
