package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** Table 1 — streaming graph clustering feature matrix. */
class Table1Bench extends AnyFunSuite {
  test("TABLE 1: streaming graph clustering algorithms") {
    val rows = Tables.table1()
    println("==== TABLE 1 (Streaming Graph Clustering Algorithms) ====")
    rows.foreach(println)
    assert(rows.exists(_.contains("S5P-Clustering")))
    assert(rows.count(_.contains("yes")) >= 4)
  }
}
