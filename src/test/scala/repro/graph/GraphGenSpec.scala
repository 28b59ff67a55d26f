package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  test("DataGraph.fromEdges dedups, drops self-loops, sorts adjacency") {
    val g = DataGraph.fromEdges(4, Seq((0, 1), (1, 0), (2, 2), (1, 3), (3, 1)))
    assert(g.numEdges == 2)
    assert(g.neighbours(1).toSeq == Seq(0, 3))
    assert(g.degree(2) == 0)
    assert(g.hasEdge(0, 1) && g.hasEdge(1, 0) && !g.hasEdge(2, 2))
  }

  test("complete and cycle factories") {
    val k5 = DataGraph.complete(5)
    assert(k5.numEdges == 10 && k5.maxDegree == 4 && k5.avgDegree == 4.0)
    val c6 = DataGraph.cycle(6)
    assert(c6.numEdges == 6 && c6.maxDegree == 2)
  }

  test("edge iterators: canonical once, directed twice") {
    val g = GraphGen.tiny("pl")
    val canon = g.edgeIterator.toVector
    assert(canon.forall { case (a, b) => a < b })
    assert(canon.size.toLong == g.numEdges)
    assert(g.directedEdgeIterator.size.toLong == 2 * g.numEdges)
  }

  test("er generator: size and determinism") {
    val a = GraphGen.er(500, 2000, seed = 42)
    val b = GraphGen.er(500, 2000, seed = 42)
    assert(a.numEdges == 2000)
    assert(a.edgeIterator.toVector == b.edgeIterator.toVector)
    val c = GraphGen.er(500, 2000, seed = 43)
    assert(a.edgeIterator.toVector != c.edgeIterator.toVector)
  }

  test("powerLaw generator: skew, degree cap, determinism") {
    val g = GraphGen.powerLaw(2000, 10000, alpha = 0.5, seed = 1, maxDegree = 120)
    assert(g.numEdges == 10000)
    assert(g.maxDegree <= 120)
    // Hubs at low ids: the top-10 vertices should own far more than 10/2000 of degree mass.
    val topMass = (0 until 10).map(g.degree).sum.toDouble / (2.0 * g.numEdges)
    assert(topMass > 0.03, s"expected degree skew, top-10 mass = $topMass")
    val h = GraphGen.powerLaw(2000, 10000, alpha = 0.5, seed = 1, maxDegree = 120)
    assert(g.edgeIterator.toVector == h.edgeIterator.toVector)
  }

  test("roadLike generator: bounded degree (grid + few shortcuts)") {
    val g = GraphGen.roadLike(side = 20, shortcuts = 10, seed = 2)
    assert(g.numVertices == 400)
    assert(g.maxDegree <= 4 + 10) // 4 grid neighbours + at most all shortcuts
    assert(g.avgDegree < 4.5)
  }

  for (name <- GraphGen.datasetNames)
    test(s"dataset $name is deterministic and well formed") {
      // Only statistics of small datasets here; big ones are bench territory.
      if (name == "GO" || name == "LJ") {
        val g = GraphGen.dataset(name)
        assert(g.numVertices > 0 && g.numEdges > 0)
        assert((0 until g.numVertices).forall { v =>
          val ns = g.neighbours(v)
          ns.sameElements(ns.sorted.distinct) && !ns.contains(v)
        })
      }
    }

  test("dataset relative ordering matches Table 3 (GO < LJ in |E|)") {
    assert(GraphGen.dataset("GO").numEdges < GraphGen.dataset("LJ").numEdges)
  }
}
