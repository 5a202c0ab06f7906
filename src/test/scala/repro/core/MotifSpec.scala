package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MotifSpec extends AnyFunSuite {

  test("catalog has the ten motifs of Figure 3, in Table 4 order") {
    assert(MotifCatalog.all.map(_.name) == Vector(
      "M(3,2)", "M(3,3)", "M(4,3)", "M(4,4)A", "M(4,4)B",
      "M(4,4)C", "M(5,4)", "M(5,5)A", "M(5,5)B", "M(5,5)C"))
  }

  val expected: Map[String, (Int, Int, Boolean)] = Map(
    // name -> (numVertices, numEdges, isCyclic)
    "M(3,2)"  -> (3, 2, false),
    "M(3,3)"  -> (3, 3, true),
    "M(4,3)"  -> (4, 3, false),
    "M(4,4)A" -> (4, 4, true),
    "M(4,4)B" -> (4, 4, true),
    "M(4,4)C" -> (4, 4, true),
    "M(5,4)"  -> (5, 4, false),
    "M(5,5)A" -> (5, 5, true),
    "M(5,5)B" -> (5, 5, true),
    "M(5,5)C" -> (5, 5, true)
  )

  for (m <- MotifCatalog.all) {
    test(s"${m.name}: node/edge counts match its name and cyclicity is consistent") {
      val (nv, ne, cyc) = expected(m.name)
      assert(m.numVertices == nv, "vertex count")
      assert(m.m == ne, "edge count")
      assert(m.isCyclic == cyc, "cyclicity")
    }

    test(s"${m.name}: spanning path is connected and edges are in label order") {
      assert(m.edges.length == m.m)
      m.edges.sliding(2).foreach {
        case Vector((_, b1), (a2, _)) => assert(b1 == a2, "consecutive edges must chain")
        case _                        =>
      }
      assert(m.vertexIds == (0 until m.numVertices).toVector, "canonical numbering")
    }

    test(s"${m.name}: no two motif edges map to the same node pair") {
      assert(m.edges.distinct.size == m.edges.size)
    }
  }

  test("byName resolves every catalog motif and rejects unknown names") {
    MotifCatalog.all.foreach(m => assert(MotifCatalog.byName(m.name) eq m))
    intercept[RuntimeException](MotifCatalog.byName("M(9,9)"))
  }

  test("motif validation rejects malformed spanning paths") {
    intercept[IllegalArgumentException](Motif("bad-start", Vector(1, 2)))
    intercept[IllegalArgumentException](Motif("bad-numbering", Vector(0, 2, 1)))
    intercept[IllegalArgumentException](Motif("self-loop", Vector(0, 0)))
    intercept[IllegalArgumentException](Motif("too-short", Vector(0)))
  }

  test("chains are exactly the acyclic motifs in the catalog") {
    val chains = MotifCatalog.all.filterNot(_.isCyclic).map(_.name)
    assert(chains == Vector("M(3,2)", "M(4,3)", "M(5,4)"))
  }
}
