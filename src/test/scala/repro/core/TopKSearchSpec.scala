package repro.core

import repro.{SparkSpec, TestGraphs}

/** Distributed top-k and the DP top-1 (Section 5) against the exhaustive
  * two-phase search.
  */
class TopKSearchSpec extends SparkSpec {

  private def graph(seed: Int) =
    TestGraphs.toDf(spark, TestGraphs.randomEdges(5, 60, 60, 9, seed = seed))

  test("global top-k flows == k best flows of the full enumeration") {
    val df = graph(51)
    val all = FlowMotifSearch.instances(spark, df, MotifCatalog.M32, 15, 0.0)
      .collect().map(_.flow).sorted(Ordering[Double].reverse)
    for (k <- Seq(1, 3, 10)) {
      val topk = TopKSearch.topK(spark, df, MotifCatalog.M32, 15, k).map(_.flow)
      assert(topk == all.take(k).toSeq, s"k=$k")
    }
  }

  test("top-k across structural matches picks the global best, not a per-match best") {
    // Two disjoint chains; the better one must win for k=1.
    val edges = Vector(
      TestGraphs.Edge(1, 2, 10, 3.0), TestGraphs.Edge(2, 3, 12, 3.0),
      TestGraphs.Edge(7, 8, 100, 50.0), TestGraphs.Edge(8, 9, 104, 60.0)
    )
    val top = TopKSearch.topK(spark, TestGraphs.toDf(spark, edges), MotifCatalog.M32, 10, 1)
    assert(top.map(_.vs.toVector) == Seq(Vector(7L, 8L, 9L)))
    assert(top.head.flow == 50.0)
  }

  test("DP max flow == top-1 flow from the heap-based search") {
    for (seed <- Seq(52, 53, 54)) {
      val df = graph(seed)
      val viaDP = TopKSearch.maxFlowDP(spark, df, MotifCatalog.M32, 15)
      val viaTopK = TopKSearch.topK(spark, df, MotifCatalog.M32, 15, 1)
        .headOption.map(_.flow).getOrElse(0.0)
      assert(math.abs(viaDP - viaTopK) < 1e-9, s"seed=$seed")
    }
  }

  test("DP max flow on a cyclic motif matches brute force") {
    val edges = TestGraphs.randomEdges(4, 50, 40, 9, seed = 55)
    val df = TestGraphs.toDf(spark, edges)
    val viaDP = TopKSearch.maxFlowDP(spark, df, MotifCatalog.M33, 12)
    val brute = TestGraphs.bruteForceAll(edges, MotifCatalog.M33, 12, 0.0)
    val bruteMax =
      if (brute.isEmpty) 0.0
      else {
        val pairs = edges.map(e => (e.src, e.dst)).toSet
        BruteForce.structuralMatches(pairs, MotifCatalog.M33).map { vs =>
          BruteForce.maxFlow(TestGraphs.seriesFor(edges, MotifCatalog.M33, vs), 12)
        }.max
      }
    assert(math.abs(viaDP - bruteMax) < 1e-9)
  }

  test("top-k on an empty graph is empty; DP max is 0") {
    val df = TestGraphs.toDf(spark, Vector.empty[TestGraphs.Edge])
    assert(TopKSearch.topK(spark, df, MotifCatalog.M32, 10, 5).isEmpty)
    assert(TopKSearch.maxFlowDP(spark, df, MotifCatalog.M32, 10) == 0.0)
  }
}
