package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Eval
import repro.graph.GraphGen

/** Table II: metric M(·), M/|E| and iteration rounds of PageRank / SSSP /
  * BFS / PHP on the cit-Patents analogue under the seven reorder methods.
  *
  * Paper's measured values (cit-Patents, |E| = 18,204,371):
  *   Default    M=1,302,313  M/|E|=0.07  PR=99 SSSP=25 BFS=36 PHP=67
  *   HubCluster M=2,303,977       0.13     94      20     34     52
  *   DegSort    M=3,623,082       0.20     77      20     25     48
  *   HubSort    M=3,691,804       0.20     77      22     26     44
  *   Gorder     M=5,875,924       0.32     76      19     22     43
  *   Rabbit     M=8,883,616       0.49     75      20     25     49
  *   GoGraph    M=13,871,315      0.76     54      14     17     27
  */
class TableIIBench extends AnyFunSuite {

  private lazy val g    = GraphGen.dataset("CP")
  private lazy val rows = Eval.tableII(g)

  test("Table II: print metric and rounds grid on the CP analogue") {
    println(Eval.renderTableII(rows))
    assert(rows.size == 7)
  }

  test("Table II shape: GoGraph achieves the highest M(·)") {
    val go = rows.find(_.method == "GoGraph").get
    rows.foreach(r => assert(go.m >= r.m, s"${r.method} M=${r.m} exceeds GoGraph ${go.m}"))
  }

  test("Table II shape: GoGraph M/|E| is far above Default's (paper: 0.76 vs 0.07)") {
    val go  = rows.find(_.method == "GoGraph").get
    val dfl = rows.find(_.method == "Default").get
    assert(dfl.mRatio < 0.2, s"Default ratio ${dfl.mRatio} should be small on a citation graph")
    assert(go.mRatio > 0.6, s"GoGraph ratio ${go.mRatio} should be high (paper 0.76)")
  }

  test("Table II shape: GoGraph needs the fewest rounds for every algorithm") {
    val go = rows.find(_.method == "GoGraph").get
    Eval.algorithms.foreach { a =>
      rows.foreach { r =>
        assert(go.rounds(a.name) <= r.rounds(a.name),
          s"${a.name}: GoGraph ${go.rounds(a.name)} > ${r.method} ${r.rounds(a.name)}")
      }
    }
  }

  test("Table II shape: higher M(·) correlates with fewer PageRank rounds") {
    // Spearman-style check: the M-ranking and the (negated) round-ranking
    // of the 7 methods should correlate strongly (paper: monotone).
    val byM      = rows.sortBy(_.m).map(_.method)
    val byRounds = rows.sortBy(-_.rounds("PageRank")).map(_.method)
    val rank1 = byM.zipWithIndex.toMap
    val rank2 = byRounds.zipWithIndex.toMap
    val n = rows.size
    val d2 = rows.map(r => math.pow(rank1(r.method) - rank2(r.method), 2)).sum
    val rho = 1.0 - 6.0 * d2 / (n * (n * n - 1))
    println(f"Spearman rho (M vs PageRank rounds): $rho%.2f")
    assert(rho > 0.5, s"metric should track rounds, rho=$rho")
  }

  test("Table II shape: GoGraph cuts PageRank rounds vs Default (paper: 99 -> 54, -45%)") {
    val go  = rows.find(_.method == "GoGraph").get.rounds("PageRank")
    val dfl = rows.find(_.method == "Default").get.rounds("PageRank")
    val reduction = 1.0 - go.toDouble / dfl
    println(f"PageRank rounds: Default=$dfl GoGraph=$go (reduction ${reduction * 100}%.0f%%)")
    assert(reduction >= 0.25, s"expected a substantial reduction, got ${reduction * 100}%")
  }
}
