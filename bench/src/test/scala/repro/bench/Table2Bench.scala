package repro.bench

import repro.TestGraphs
import repro.core.MaxFlowDP

/** Paper Table 2: the DP module walk-through matrix for the Figure 7 match,
  * window [10, 20], δ = 10. (Pure-local; printed so EXPERIMENTS.md can diff
  * it against the paper's printed matrix.)
  */
class Table2Bench extends BenchBase {

  test("Table 2: DP matrix for window [10,20]") {
    banner("TABLE 2 — DP module example (window [10,20], δ=10)")
    val (ts, table) = MaxFlowDP.dpTable(TestGraphs.table2Series, 10, 20)
    println(("t_i" +: ts.map(_.toString)).map(s => f"$s%-8s").mkString)
    for ((row, k) <- table.zipWithIndex)
      println((s"κ=${k + 1}" +: row.map(v => f"$v%.0f")).map(s => f"$s%-8s").mkString)
    assert(table.last.last == 5.0, "top-1 flow of the window (paper: 5)")
  }
}
