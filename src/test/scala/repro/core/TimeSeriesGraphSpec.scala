package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}

/** Multigraph -> time-series graph conversion (Section 4, Figure 5). */
class TimeSeriesGraphSpec extends SparkSpec {

  private lazy val fig2 = TestGraphs.toDf(spark, TestGraphs.fig2Edges).cache()

  test("parallel edges merge into one series per connected pair (Figure 5)") {
    val tsg = TimeSeriesGraph.build(fig2).collect()
    assert(tsg.length == 3)
    val row = tsg.find(r => r.getLong(0) == 1L && r.getLong(1) == 2L).get
    val series = row.getSeq[org.apache.spark.sql.Row](2).map(r => (r.getLong(0), r.getDouble(1)))
    assert(series == Seq((13L, 5.0), (15L, 7.0)))
  }

  test("series are sorted by timestamp even when input is shuffled") {
    val shuffled = TestGraphs.toDf(spark, new scala.util.Random(1).shuffle(TestGraphs.fig2Edges))
    val row = TimeSeriesGraph.build(shuffled)
      .where(col("src") === 1 && col("dst") === 2).head
    val series = row.getSeq[org.apache.spark.sql.Row](2).map(_.getLong(0))
    assert(series == Seq(13L, 15L))
  }

  test("self-loop interactions are dropped") {
    val withLoop = TestGraphs.toDf(spark,
      TestGraphs.fig2Edges :+ TestGraphs.Edge(1, 1, 99, 1.0))
    assert(TimeSeriesGraph.build(withLoop).count() == 3)
    assert(TimeSeriesGraph.pairs(withLoop).count() == 3)
  }

  test("pairs() equals DuckDB's distinct pair count (oracle)") {
    val edges = TestGraphs.toDf(spark, TestGraphs.randomEdges(8, 80, 100, 9, seed = 11))
    val got = TimeSeriesGraph.pairs(edges).agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got,
      "SELECT count(*) AS n FROM (SELECT DISTINCT src, dst FROM edges WHERE src <> dst)",
      "edges" -> edges)
  }

  test("per-pair series lengths equal DuckDB group sizes (oracle)") {
    val edges = TestGraphs.toDf(spark, TestGraphs.randomEdges(6, 60, 80, 9, seed = 12))
    val got = TimeSeriesGraph.build(edges)
      .select(col("src"), col("dst"), size(col("series")).as("n"))
    Oracle.assertEquivalent(got,
      "SELECT src, dst, count(*) AS n FROM edges WHERE src <> dst GROUP BY src, dst",
      "edges" -> edges)
  }

  test("per-pair flow sums equal DuckDB aggregation (oracle)") {
    val edges = TestGraphs.toDf(spark, TestGraphs.randomEdges(6, 60, 80, 9, seed = 13))
    val got = TimeSeriesGraph.build(edges)
      .select(col("src"), col("dst"),
        aggregate(col("series"), lit(0.0), (acc, x) => acc + x.getField("f")).as("total"))
    Oracle.assertEquivalent(got,
      "SELECT src, dst, sum(CAST(f AS DOUBLE)) AS total FROM edges WHERE src <> dst GROUP BY src, dst",
      "edges" -> edges)
  }

  test("empty input produces an empty time-series graph") {
    val empty = TestGraphs.toDf(spark, Vector.empty[TestGraphs.Edge])
    assert(TimeSeriesGraph.build(empty).count() == 0)
  }
}
