package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** Table 5 — approximation ratios α = RF/Opt on the tiny instances, k=4,
  * with the exact optimum from branch-and-bound enumeration.
  */
class Table5Bench extends AnyFunSuite {
  test("TABLE 5: optimality on tiny graphs (k=4)") {
    val rows = Tables.table5()
    println("==== TABLE 5 (Optimality; ours vs paper) ====")
    rows.foreach(println)
    // S5P's α must be the smallest of the three on every instance.
    val groups = rows.foldLeft(List.empty[List[String]]) {
      case (acc, r) if !r.startsWith(" ") => List(r) :: acc
      case (h :: t, r) => (h :+ r) :: t
      case (Nil, r) => List(List(r))
    }.reverse
    for (grp <- groups) {
      val alphas = grp.tail.map { r =>
        val name = r.trim.split("\\s+")(0)
        val a = raw"alpha=([0-9.]+)".r.findFirstMatchIn(r).get.group(1).toDouble
        name -> a
      }.toMap
      assert(alphas("S5P") <= alphas.values.min + 1e-9,
        s"${grp.head}: S5P alpha ${alphas("S5P")} vs $alphas")
      assert(alphas.values.forall(_ >= 1.0 - 1e-9), "alpha is a ratio to the optimum")
    }
  }
}
