package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.{InteractionGen, NetworkStats}

/** Regenerates the paper's Table 3 (dataset statistics) on the synthetic
  * substitutes. Usage: spark-submit ... repro.jobs.Table3Job [sf]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = JobSession.create("Table3")
    try {
      println(f"${"Dataset"}%-16s ${"#nodes"}%10s ${"#pairs"}%10s ${"#edges"}%10s ${"avg flow"}%10s")
      for ((name, df) <- Seq(
        ("Bitcoin-like", InteractionGen.bitcoinLike(spark, sf)),
        ("Facebook-like", InteractionGen.facebookLike(spark, sf)),
        ("Passenger-like", InteractionGen.passengerLike(spark, sf)))) {
        val s = NetworkStats.stats(df)
        println(f"$name%-16s ${s.nodes}%10d ${s.connectedPairs}%10d ${s.edges}%10d ${s.avgFlow}%10.3f")
      }
    } finally spark.stop()
  }
}
