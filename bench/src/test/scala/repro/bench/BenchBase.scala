package repro.bench

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.data.InteractionGen

/** Shared scaffolding for the table/figure benches. Every bench prints
  * paper-style rows to stdout; `sbt "bench/test" | tee bench_output.txt`
  * regenerates every number reported in EXPERIMENTS.md.
  *
  * BENCH_SF scales all three datasets (default 1.0 = the scaled-down
  * substitutes described in DESIGN.md §4).
  */
trait BenchBase extends SparkSpec {
  val benchSf: Double = sys.env.getOrElse("BENCH_SF", "1.0").toDouble

  /** The three datasets with their paper-default (δ, φ). */
  lazy val datasets: Seq[(String, DataFrame, Long, Double)] = Seq(
    ("Bitcoin-like", InteractionGen.bitcoinLike(spark, benchSf).cache(), 600L, 5.0),
    ("Facebook-like", InteractionGen.facebookLike(spark, benchSf).cache(), 600L, 3.0),
    ("Passenger-like", InteractionGen.passengerLike(spark, benchSf).cache(), 900L, 2.0)
  )

  def timed[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e9)
  }

  def banner(s: String): Unit = {
    println()
    println("=" * 78)
    println(s)
    println("=" * 78)
  }
}
