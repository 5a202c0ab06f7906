package repro.bench

import repro.core.{FlowMotifSearch, MotifCatalog}

/** Paper Figure 9: instances and runtime versus δ (φ at its default).
  * Shape: both grow with δ; runtime grows slower than the result count.
  */
class Fig9DeltaSensitivityBench extends BenchBase {

  private val motifs = Seq(MotifCatalog.M32, MotifCatalog.M33, MotifCatalog.M43, MotifCatalog.M55A)

  test("Figure 9: sensitivity to δ") {
    banner("FIGURE 9 — #instances and runtime for varying δ (φ = default)")
    println(f"${"Dataset"}%-16s${"Motif"}%-10s${"δ"}%8s${"instances"}%12s${"time(s)"}%10s")
    for ((name, df, deltaDefault, phi) <- datasets; m <- motifs) {
      val counts = scala.collection.mutable.ArrayBuffer[Long]()
      for (mult <- Seq(0.5, 1.0, 2.0, 4.0)) {
        val delta = (deltaDefault * mult).toLong
        val (n, secs) = timed(FlowMotifSearch.countInstances(spark, df, m, delta, phi))
        println(f"$name%-16s${m.name}%-10s$delta%8d$n%12d$secs%10.2f")
        counts += n
      }
      // Maximal-instance counts are not theoretically monotone in δ (windows
      // can merge), but the paper's empirical growth must hold end-to-end.
      assert(counts.last >= counts.head,
        s"$name ${m.name}: instances should grow from 0.5x to 4x default δ: $counts")
    }
  }
}
