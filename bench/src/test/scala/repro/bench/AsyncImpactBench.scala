package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.{PageRank, SSSP, SparkBlockAsyncEngine}
import repro.eval.Eval
import repro.graph.GraphGen
import repro.order.DefaultOrder
import repro.SparkSpec

/** Fig 8 as a table: Sync+Default vs Async+Default vs Async+GoGraph for
  * PageRank and SSSP. Paper headline: Async+GoGraph is 1.56×–6.30× faster
  * than Sync+Default (3.04× mean). Also exercises the distributed
  * block-async engine at a fixed block count to show the superstep
  * reduction carries over to the Pregel-style runtime.
  */
class AsyncImpactBench extends SparkSpec {

  private lazy val rows = Eval.asyncImpact(GraphGen.datasetNames, GraphGen.dataset)

  test("Fig 8: print the mode/order grid") {
    println(Eval.renderAsyncImpact(rows))
    assert(rows.size == GraphGen.datasetNames.size * 2)
  }

  test("Fig 8 shape: rounds order sync >= asyncDefault >= asyncGoGraph") {
    rows.foreach { r =>
      assert(r.syncDef.rounds >= r.asyncDef.rounds,
        s"${r.dataset}/${r.algo}: sync ${r.syncDef.rounds} < asyncDef ${r.asyncDef.rounds}")
      assert(r.asyncDef.rounds >= r.asyncGo.rounds,
        s"${r.dataset}/${r.algo}: asyncDef ${r.asyncDef.rounds} < asyncGo ${r.asyncGo.rounds}")
    }
  }

  test("Fig 8 shape: Async+GoGraph achieves a mean speedup over Sync+Default") {
    val speedups = rows.map(r => r.syncDef.runtimeMs / math.max(1e-9, r.asyncGo.runtimeMs))
    val geo = math.exp(speedups.map(math.log).sum / speedups.size)
    println(f"Geo-mean Async+GoGraph speedup over Sync+Default: $geo%.2fx (paper mean 3.04x)")
    assert(geo > 1.3, s"expected a clear speedup, got ${geo}x")
  }

  test("Fig 8 distributed: block-async supersteps drop from sync to GoGraph order (CP, 8 blocks)") {
    val g = GraphGen.dataset("CP")
    val src = Eval.defaultSource(g)
    // |V| blocks would mean |V| Spark partitions; the sync round count is
    // engine-independent (verified in unit tests), so take it sequentially
    val syncSteps = repro.engine.SeqEngine.sync(g, SSSP, src).rounds
    val defSteps = SparkBlockAsyncEngine.run(
      spark, g, SSSP, DefaultOrder.order(g), src, numBlocks = 8).rounds
    val goSteps = SparkBlockAsyncEngine.run(
      spark, g, SSSP, repro.core.GoGraph.order(g), src, numBlocks = 8).rounds
    println(s"Block-async SSSP supersteps on CP: sync(|V| blocks)=$syncSteps, " +
      s"Default(8 blocks)=$defSteps, GoGraph(8 blocks)=$goSteps")
    assert(goSteps <= defSteps && defSteps <= syncSteps)
  }

  test("Fig 8 distributed: PageRank supersteps shrink under GoGraph order (WK, 8 blocks)") {
    val g = GraphGen.dataset("WK")
    val defSteps = SparkBlockAsyncEngine.run(
      spark, g, PageRank, DefaultOrder.order(g), numBlocks = 8).rounds
    val goSteps = SparkBlockAsyncEngine.run(
      spark, g, PageRank, repro.core.GoGraph.order(g), numBlocks = 8).rounds
    println(s"Block-async PageRank supersteps on WK: Default=$defSteps GoGraph=$goSteps")
    assert(goSteps <= defSteps)
  }
}
