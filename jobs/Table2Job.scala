package repro.jobs

import repro.harness.Tables

/** spark-submit entrypoint for Table 2 (dataset statistics).
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    println("==== TABLE 2 (Details of Graphs; ours vs paper) ====")
    Tables.table2().foreach(println)
  }
}
