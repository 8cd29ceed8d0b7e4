package repro.engine

import repro.SparkSpec
import repro.graph.{DiGraph, GraphGen}

class SparkSyncEngineSpec extends SparkSpec {

  private val fig2: DiGraph =
    DiGraph.fromEdges(5, Seq((0, 1, 1.0), (0, 4, 4.0), (1, 4, 1.0), (4, 2, 1.0), (4, 3, 1.0)))

  test("SSSP rounds on Fig 2 match the sequential sync engine (4)") {
    val res = SparkSyncEngine.run(spark, fig2, SSSP, source = 0)
    assert(res.rounds == 4)
    assert(res.converged)
  }

  test("SSSP states on Fig 2 match the sequential engine") {
    val res = SparkSyncEngine.run(spark, fig2, SSSP, source = 0)
    val got = SparkSyncEngine.collectStates(res, 5)
    assert(got.toSeq == Seq(0.0, 1.0, 3.0, 3.0, 2.0))
  }

  test("PageRank rounds and states match the sequential sync engine") {
    val g = GraphGen.rmat(80, 500, seed = 90)
    val seq = SeqEngine.sync(g, PageRank)
    val spk = SparkSyncEngine.run(spark, g, PageRank)
    assert(spk.rounds == seq.rounds, s"spark=${spk.rounds} seq=${seq.rounds}")
    val got = SparkSyncEngine.collectStates(spk, 80)
    got.zip(seq.states).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"$a vs $b") }
  }

  test("BFS levels match the sequential engine") {
    val g = GraphGen.rmat(100, 600, seed = 91)
    val src = (0 until 100).maxBy(g.outDegree)
    val seq = SeqEngine.sync(g, BFS, src)
    val spk = SparkSyncEngine.run(spark, g, BFS, src)
    assert(spk.rounds == seq.rounds)
    assert(SparkSyncEngine.collectStates(spk, 100).toSeq == seq.states.toSeq)
  }

  test("CC labels match the sequential engine on a disconnected graph") {
    val g = DiGraph.unweighted(10, Seq((0, 1), (1, 2), (4, 5), (7, 8), (8, 9)))
    val seq = SeqEngine.sync(g, CC)
    val spk = SparkSyncEngine.run(spark, g, CC)
    assert(SparkSyncEngine.collectStates(spk, 10).toSeq == seq.states.toSeq)
  }

  test("PHP states match the sequential engine") {
    val g = GraphGen.rmat(60, 360, seed = 92)
    val src = (0 until 60).maxBy(g.outDegree)
    val seq = SeqEngine.sync(g, PHP, src)
    val spk = SparkSyncEngine.run(spark, g, PHP, src)
    assert(spk.rounds == seq.rounds)
    SparkSyncEngine.collectStates(spk, 60).zip(seq.states).foreach {
      case (a, b) => assert(math.abs(a - b) < 1e-9)
    }
  }

  test("SSWP states match the sequential engine") {
    val g = GraphGen.erdosRenyi(50, 300, seed = 93)
    val seq = SeqEngine.sync(g, SSWP, 0)
    val spk = SparkSyncEngine.run(spark, g, SSWP, 0)
    assert(SparkSyncEngine.collectStates(spk, 50).toSeq == seq.states.toSeq)
  }

  test("maxRounds caps execution") {
    val g = GraphGen.rmat(50, 300, seed = 94)
    val res = SparkSyncEngine.run(spark, g, PageRank, maxRounds = 2)
    assert(res.rounds == 2 && !res.converged)
  }

  test("unreachable vertices keep infinite distance") {
    val g = DiGraph.unweighted(4, Seq((0, 1), (2, 3))) // 2,3 unreachable from 0
    val res = SparkSyncEngine.run(spark, g, SSSP, source = 0)
    val st = SparkSyncEngine.collectStates(res, 4)
    assert(st(2).isPosInfinity && st(3).isPosInfinity)
  }
}
