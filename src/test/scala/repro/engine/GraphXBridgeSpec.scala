package repro.engine

import repro.SparkSpec
import repro.core.GoGraph
import repro.graph.{DiGraph, GraphGen}
import repro.order.DefaultOrder

class GraphXBridgeSpec extends SparkSpec {

  private val fig2: DiGraph =
    DiGraph.fromEdges(5, Seq((0, 1, 1.0), (0, 4, 4.0), (1, 4, 1.0), (4, 2, 1.0), (4, 3, 1.0)))

  test("GraphX SSSP distances match the sequential engine (default order)") {
    val (dist, _) = GraphXBridge.ssspSupersteps(spark, fig2, DefaultOrder.order(fig2), source = 0)
    assert(dist.toSeq == Seq(0.0, 1.0, 3.0, 3.0, 2.0))
  }

  test("GraphX SSSP distances are invariant under GoGraph relabeling") {
    val g = GraphGen.rmat(60, 360, seed = 110)
    val src = (0 until 60).maxBy(g.outDegree)
    val (defDist, _) = GraphXBridge.ssspSupersteps(spark, g, DefaultOrder.order(g), src)
    val (goDist, _)  = GraphXBridge.ssspSupersteps(spark, g, GoGraph.order(g), src)
    assert(defDist.toSeq == goDist.toSeq, "reordering must not change results")
    assert(defDist.toSeq == References.dijkstra(g, src).toSeq)
  }

  test("GraphX BSP supersteps match the synchronous engine's round count") {
    val g = GraphGen.rmat(80, 480, seed = 111)
    val src = (0 until 80).maxBy(g.outDegree)
    val seqRounds = SeqEngine.sync(g, SSSP, src).rounds
    val (_, steps) = GraphXBridge.ssspSupersteps(spark, g, DefaultOrder.order(g), src)
    assert(steps == seqRounds, s"graphx=$steps seq=$seqRounds")
  }

  test("ordinal block strategy maps destination ranges to partitions") {
    val s = GraphXBridge.OrdinalBlockStrategy(100)
    assert(s.getPartition(0, 0, 4) == 0)
    assert(s.getPartition(0, 99, 4) == 3)
    assert(s.getPartition(50, 25, 4) == 1)
  }
}
