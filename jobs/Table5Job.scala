package repro.jobs

import repro.harness.Tables

/** spark-submit entrypoint for Table 5 (optimality on tiny graphs, k=4). */
object Table5Job {
  def main(args: Array[String]): Unit = {
    println("==== TABLE 5 (Optimality; ours vs paper) ====")
    Tables.table5().foreach(println)
  }
}
