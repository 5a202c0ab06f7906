package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}

/** Flow-permutation randomization (Section 6.3): structure and timestamps are
  * preserved exactly; the multiset of flows is preserved but re-assigned.
  */
class RandomizerSpec extends SparkSpec {

  private lazy val edges =
    TestGraphs.toDf(spark, TestGraphs.randomEdges(6, 120, 100, 9, seed = 61)).cache()

  test("(src, dst, t) multiset is unchanged") {
    val perm = Randomizer.permuteFlows(edges, seed = 1)
    val a = edges.select("src", "dst", "t").collect().map(_.toString).sorted
    val b = perm.select("src", "dst", "t").collect().map(_.toString).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("flow multiset is unchanged (oracle: total and per-value histogram)") {
    val perm = Randomizer.permuteFlows(edges, seed = 2)
    val got = perm.groupBy(col("f")).agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got,
      "SELECT CAST(f AS DOUBLE) AS f, count(*) AS n FROM edges GROUP BY f",
      "edges" -> edges)
  }

  test("row count unchanged") {
    assert(Randomizer.permuteFlows(edges, 3).count() == edges.count())
  }

  test("the permutation actually moves flows (with overwhelming probability)") {
    val before = edges.orderBy("src", "dst", "t").select("f").collect().map(_.getDouble(0))
    val after = Randomizer.permuteFlows(edges, 4)
      .orderBy("src", "dst", "t").select("f").collect().map(_.getDouble(0))
    assert(before.toSeq != after.toSeq)
  }

  test("different seeds give different permutations") {
    val a = Randomizer.permuteFlows(edges, 5).orderBy("src", "dst", "t").select("f")
      .collect().map(_.getDouble(0))
    val b = Randomizer.permuteFlows(edges, 6).orderBy("src", "dst", "t").select("f")
      .collect().map(_.getDouble(0))
    assert(a.toSeq != b.toSeq)
  }

  test("structural matches are identical before and after permutation (paper's invariant)") {
    import repro.core.{MotifCatalog, StructuralMatcher, TimeSeriesGraph}
    val perm = Randomizer.permuteFlows(edges, 7)
    val a = StructuralMatcher.matches(TimeSeriesGraph.pairs(edges), MotifCatalog.M33).count()
    val b = StructuralMatcher.matches(TimeSeriesGraph.pairs(perm), MotifCatalog.M33).count()
    assert(a == b)
  }

  test("with φ=0, instance counts are identical on real and permuted graphs") {
    import repro.core.{FlowMotifSearch, MotifCatalog}
    val perm = Randomizer.permuteFlows(edges, 8)
    val a = FlowMotifSearch.countInstances(spark, edges, MotifCatalog.M32, 15, 0.0)
    val b = FlowMotifSearch.countInstances(spark, perm, MotifCatalog.M32, 15, 0.0)
    assert(a == b, "φ=0 instances depend only on structure+time, which are preserved")
  }
}
