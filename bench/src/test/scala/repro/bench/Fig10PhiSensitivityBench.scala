package repro.bench

import repro.core.{FlowMotifSearch, MotifCatalog}

/** Paper Figure 10: instances and runtime versus φ (δ at its default).
  * Shape: both drop as φ grows (φ-prefix pruning).
  */
class Fig10PhiSensitivityBench extends BenchBase {

  private val motifs = Seq(MotifCatalog.M32, MotifCatalog.M33, MotifCatalog.M43, MotifCatalog.M55A)

  test("Figure 10: sensitivity to φ") {
    banner("FIGURE 10 — #instances and runtime for varying φ (δ = default)")
    println(f"${"Dataset"}%-16s${"Motif"}%-10s${"φ"}%8s${"instances"}%12s${"time(s)"}%10s")
    for ((name, df, delta, phiDefault) <- datasets; m <- motifs) {
      val counts = scala.collection.mutable.ArrayBuffer[Long]()
      for (mult <- Seq(0.4, 1.0, 2.0, 4.0)) {
        val phi = phiDefault * mult
        val (n, secs) = timed(FlowMotifSearch.countInstances(spark, df, m, delta, phi))
        println(f"$name%-16s${m.name}%-10s$phi%8.1f$n%12d$secs%10.2f")
        counts += n
      }
      assert(counts.toSeq == counts.sorted(Ordering[Long].reverse),
        s"$name ${m.name}: instances must not grow as φ grows: $counts")
    }
  }
}
