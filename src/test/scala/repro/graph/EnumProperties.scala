package repro.graph

import org.scalacheck.{Gen, Prop, Properties}
import repro.core._

/** Property-based checks over random data graphs and random query graphs:
  * the whole plan/translate/execute pipeline agrees with the reference
  * enumerator on arbitrary inputs, not just the curated query set.
  */
object EnumProperties extends Properties("Enum") {

  val genDataGraph: Gen[DataGraph] = for {
    n    <- Gen.choose(8, 60)
    m    <- Gen.choose(n, 4 * n)
    seed <- Gen.choose(0L, 1000000L)
  } yield GraphGen.er(n, m, seed)

  /** Random connected query graph: a random spanning tree plus extra edges. */
  val genQueryGraph: Gen[QueryGraph] = for {
    n     <- Gen.choose(3, 5)
    seed  <- Gen.choose(0L, 1000000L)
  } yield {
    val rng  = new scala.util.Random(seed)
    val tree = (1 until n).map(v => (rng.nextInt(v), v))
    val all  = for { a <- 0 until n; b <- a + 1 until n } yield (a, b)
    val extra = rng.shuffle(all.filterNot(tree.contains)).take(rng.nextInt(3))
    QueryGraph(n, tree ++ extra)
  }

  property("matches = subgraphs * |Aut| on random graphs") =
    Prop.forAll(genDataGraph, genQueryGraph) { (g, q) =>
      val total  = LocalEnum.countMatches(q, g)
      val broken = LocalEnum.countMatches(q, g, q.symmetryConditions)
      total == broken * q.automorphisms.size
    }

  property("optimised dataflow equals reference count on random inputs") =
    Prop.forAll(genDataGraph, genQueryGraph) { (g, q) =>
      val cost = CostModel.er(math.max(2, g.numVertices).toLong, math.max(1, g.numEdges))
      val plan = Optimiser.optimise(q, cost, OptimiserConfig.huge(3))
      val op   = Dataflow.fromPlan(plan, q, q.symmetryConditions)
      SimpleExec.count(op, g) == LocalEnum.countSubgraphs(q, g)
    }

  property("SEED-space dataflow equals reference count on random inputs") =
    Prop.forAll(genDataGraph, genQueryGraph) { (g, q) =>
      val cost = CostModel.er(math.max(2, g.numVertices).toLong, math.max(1, g.numEdges))
      val plan = Optimiser.optimise(q, cost, OptimiserConfig.seed(3))
      val op   = Dataflow.fromPlan(plan, q, q.symmetryConditions)
      SimpleExec.count(op, g) == LocalEnum.countSubgraphs(q, g)
    }

  property("wco (BiGJoin) plan equals reference count on random inputs") =
    Prop.forAll(genDataGraph, genQueryGraph) { (g, q) =>
      val op = Dataflow.fromPlan(LogicalPlans.bigJoin(q), q, q.symmetryConditions)
      SimpleExec.count(op, g) == LocalEnum.countSubgraphs(q, g)
    }

  property("sorted intersection equals set intersection") =
    Prop.forAll(Gen.listOf(Gen.choose(0, 50)), Gen.listOf(Gen.choose(0, 50))) { (a, b) =>
      val sa = a.distinct.sorted.toArray
      val sb = b.distinct.sorted.toArray
      Intersect.sorted(sa, sb).toSet == (sa.toSet & sb.toSet)
    }

  property("generated graphs are well-formed") =
    Prop.forAll(genDataGraph) { g =>
      (0 until g.numVertices).forall { v =>
        val ns = g.neighbours(v)
        ns.sameElements(ns.distinct.sorted) && !ns.contains(v) &&
          ns.forall(w => g.neighbours(w).contains(v))
      }
    }
}
