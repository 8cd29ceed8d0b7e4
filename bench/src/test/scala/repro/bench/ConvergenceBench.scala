package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.{PageRank, SSSP}
import repro.eval.Eval
import repro.graph.GraphGen

/** Fig 7 as a table: distance to convergence, dist_t = |Σx* − Σx_t|, after
  * each async round for PageRank and SSSP on the CP and LJ analogues.
  * Paper headline: GoGraph reaches a given convergence state in 59% of the
  * mean time of the other orders (min 37%).
  */
class ConvergenceBench extends AnyFunSuite {

  test("Fig 7: PageRank convergence distance per round on CP and LJ") {
    Seq("CP", "LJ").foreach { name =>
      val g = GraphGen.dataset(name)
      val rows = Eval.convergence(g, PageRank, rounds = 8)
      println(Eval.renderConvergence(rows, s"PageRank/$name"))
      val byName = rows.map(r => r.method -> r.distByRound).toMap
      // GoGraph is closest to convergence at every sampled round
      (0 until 8).foreach { k =>
        val go = byName("GoGraph")(k)
        assert(go <= byName("Default")(k) + 1e-9,
          s"$name round ${k + 1}: GoGraph $go above Default ${byName("Default")(k)}")
      }
    }
  }

  test("Fig 7: SSSP convergence distance per round on CP") {
    val g = GraphGen.dataset("CP")
    val rows = Eval.convergence(g, SSSP, rounds = 6)
    println(Eval.renderConvergence(rows, "SSSP/CP"))
    val byName = rows.map(r => r.method -> r.distByRound).toMap
    val lastK = 5
    assert(byName("GoGraph")(lastK) <= byName("Default")(lastK) + 1e-9)
  }

  test("Fig 7 shape: distances are non-increasing for every method (monotone convergence)") {
    val g = GraphGen.dataset("CP")
    val rows = Eval.convergence(g, PageRank, rounds = 6)
    rows.foreach { r =>
      r.distByRound.sliding(2).foreach {
        case Seq(a, b) => assert(b <= a + 1e-6, s"${r.method}: $a -> $b increased")
        case _         =>
      }
    }
  }
}
