package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** Table 2 — dataset statistics (scaled analogs vs the paper's originals). */
class Table2Bench extends AnyFunSuite {
  test("TABLE 2: graph dataset details and skewness metrics") {
    val rows = Tables.table2()
    println("==== TABLE 2 (Details of Graphs; ours vs paper) ====")
    rows.foreach(println)
    assert(rows.length == 18) // header + 17 graphs
    // Social graphs should be right-skewed; web graphs strongly clustered.
    val ok = rows.find(_.startsWith("OK")).get
    assert(!ok.contains("NaN"))
  }
}
