package repro.stats

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{FlowMotifSearch, Motif}
import repro.data.Randomizer

/** Statistical significance of flow motifs (Section 6.3): compare the number
  * of instances in the real network against flow-permuted randomizations and
  * report the z-score `z_M = (r_M - μ_M) / σ_M`.
  */
object Significance {

  final case class MotifSignificance(
      motif: String,
      real: Long,
      randomCounts: Seq[Long],
      mean: Double,
      std: Double,
      z: Double,
      empiricalP: Double
  )

  /** Population standard deviation, as used for z-scores over the R runs. */
  def stdDev(xs: Seq[Long]): Double = {
    val mu = xs.map(_.toDouble).sum / xs.size
    math.sqrt(xs.map(x => (x - mu) * (x - mu)).sum / xs.size)
  }

  def zScore(real: Long, randomCounts: Seq[Long]): (Double, Double, Double) = {
    val mu = randomCounts.map(_.toDouble).sum / randomCounts.size
    val sd = stdDev(randomCounts)
    val z = if (sd == 0.0) { if (real.toDouble == mu) 0.0 else Double.PositiveInfinity * math.signum(real - mu) }
            else (real - mu) / sd
    (mu, sd, z)
  }

  /** Run the full study for one motif: real count + `nRandom` permuted counts. */
  def study(
      spark: SparkSession,
      edges: DataFrame,
      motif: Motif,
      delta: Long,
      phi: Double,
      nRandom: Int,
      seed: Long = 7L
  ): MotifSignificance = {
    val real = FlowMotifSearch.countInstances(spark, edges, motif, delta, phi)
    val randomCounts = (0 until nRandom).map { r =>
      val permuted = Randomizer.permuteFlows(edges, seed + r)
      FlowMotifSearch.countInstances(spark, permuted, motif, delta, phi)
    }
    val (mu, sd, z) = zScore(real, randomCounts)
    val p = randomCounts.count(_ >= real).toDouble / nRandom
    MotifSignificance(motif.name, real, randomCounts, mu, sd, z, p)
  }
}
