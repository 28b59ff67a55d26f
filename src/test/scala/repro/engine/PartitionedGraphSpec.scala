package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.TestGraphs

class PartitionedGraphSpec extends AnyFunSuite {

  val g  = TestGraphs.pl
  val pg = new PartitionedGraph(g, 4)

  test("owner is total and in range") {
    assert((0 until g.numVertices).forall(v => pg.owner(v) >= 0 && pg.owner(v) < 4))
  }

  test("local vertex sets partition the graph") {
    val all = (0 until 4).flatMap(m => pg.localVertices(m).toVector)
    assert(all.sorted == (0 until g.numVertices).toVector)
  }

  test("partitions are roughly balanced (hash, not range)") {
    val sizes = (0 until 4).map(m => pg.localVertices(m).size)
    assert(sizes.min > g.numVertices / 10, sizes.toString)
  }

  test("localNbrs guards against remote reads") {
    val v = 0
    val owner = pg.owner(v)
    assert(pg.localNbrs(v, owner).sameElements(g.neighbours(v)))
    intercept[IllegalArgumentException] { pg.localNbrs(v, (owner + 1) % 4) }
  }

  test("serveNbrs answers for any vertex (the RPC server path)") {
    assert(pg.serveNbrs(1).sameElements(g.neighbours(1)))
  }

  test("k=1 owns everything") {
    val solo = new PartitionedGraph(g, 1)
    assert((0 until g.numVertices).forall(v => solo.owner(v) == 0))
  }
}
