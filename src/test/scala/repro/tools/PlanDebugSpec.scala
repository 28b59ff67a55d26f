package repro.tools
import org.scalatest.funsuite.AnyFunSuite
import repro.core._, repro.graph._
class PlanDebugSpec extends AnyFunSuite {
  val lj = CostModel.fromStats(4847571L, 43369619L, 20333)
  def show(p: PlanNode, ind: String = ""): Unit = p match {
    case UnitScan(u) => info(s"${ind}SCAN ${u.edges}")
    case JoinNode(s, l, r, st) =>
      info(s"${ind}JOIN ${s.edges} $st")
      show(l, ind + "  "); show(r, ind + "  ")
  }
  for ((n, q) <- Queries.all) test(s"print $n plan at LJ scale") {
    show(Optimiser.optimise(q, lj, OptimiserConfig.huge(10)))
  }
}
