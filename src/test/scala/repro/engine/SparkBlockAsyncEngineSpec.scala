package repro.engine

import repro.SparkSpec
import repro.core.GoGraph
import repro.graph.{DiGraph, GraphGen}
import repro.order.{DefaultOrder, VertexOrder}

class SparkBlockAsyncEngineSpec extends SparkSpec {

  private val fig2: DiGraph =
    DiGraph.fromEdges(5, Seq((0, 1, 1.0), (0, 4, 4.0), (1, 4, 1.0), (4, 2, 1.0), (4, 3, 1.0)))

  test("numBlocks=1 reproduces the sequential async engine exactly (Fig 2c)") {
    val o = DefaultOrder.order(fig2)
    val res = SparkBlockAsyncEngine.run(spark, fig2, SSSP, o, source = 0, numBlocks = 1)
    assert(res.rounds == 3)
    assert(res.states.toSeq == Seq(0.0, 1.0, 3.0, 3.0, 2.0))
  }

  test("numBlocks=1 with the reordered Fig 2d order takes 2 supersteps") {
    val o = VertexOrder.fromOrder(Array(0, 1, 4, 2, 3))
    val res = SparkBlockAsyncEngine.run(spark, fig2, SSSP, o, source = 0, numBlocks = 1)
    assert(res.rounds == 2)
  }

  test("numBlocks=|V| reproduces the synchronous engine (Fig 2b: 4 rounds)") {
    val o = DefaultOrder.order(fig2)
    val res = SparkBlockAsyncEngine.run(spark, fig2, SSSP, o, source = 0, numBlocks = 5)
    assert(res.rounds == 4)
  }

  test("PageRank identities: 1 block = async rounds, |V| blocks = sync rounds") {
    val g = GraphGen.rmat(60, 400, seed = 100)
    val o = DefaultOrder.order(g)
    val asyncRef = SeqEngine.async(g, PageRank, o)
    val syncRef  = SeqEngine.sync(g, PageRank)
    val one = SparkBlockAsyncEngine.run(spark, g, PageRank, o, numBlocks = 1)
    val all = SparkBlockAsyncEngine.run(spark, g, PageRank, o, numBlocks = 60)
    assert(one.rounds == asyncRef.rounds, s"1-block ${one.rounds} vs async ${asyncRef.rounds}")
    assert(all.rounds == syncRef.rounds, s"V-block ${all.rounds} vs sync ${syncRef.rounds}")
  }

  test("intermediate block counts land between async and sync rounds") {
    val g = GraphGen.datasetSmall("CP")
    val o = DefaultOrder.order(g)
    val src = (0 until g.numVertices).maxBy(g.outDegree)
    val asyncR = SeqEngine.async(g, SSSP, o, src).rounds
    val syncR  = SeqEngine.sync(g, SSSP, src).rounds
    val midR   = SparkBlockAsyncEngine.run(spark, g, SSSP, o, src, numBlocks = 4).rounds
    assert(midR >= asyncR && midR <= syncR, s"async=$asyncR mid=$midR sync=$syncR")
  }

  test("states converge to the sync fixed point regardless of block count") {
    val g = GraphGen.rmat(80, 600, seed = 101)
    val o = DefaultOrder.order(g)
    val ref = SeqEngine.sync(g, PageRank).states
    Seq(1, 3, 8).foreach { nb =>
      val res = SparkBlockAsyncEngine.run(spark, g, PageRank, o, numBlocks = nb)
      res.states.zip(ref).foreach { case (a, b) =>
        assert(math.abs(a - b) < 1e-4, s"blocks=$nb: $a vs $b")
      }
    }
  }

  test("GoGraph order needs no more supersteps than Default at fixed block count (repro hint)") {
    val g = GraphGen.datasetSmall("CP")
    val src = (0 until g.numVertices).maxBy(g.outDegree)
    val defR = SparkBlockAsyncEngine.run(spark, g, SSSP, DefaultOrder.order(g), src, numBlocks = 4).rounds
    val goR  = SparkBlockAsyncEngine.run(spark, g, SSSP, GoGraph.order(g), src, numBlocks = 4).rounds
    assert(goR <= defR, s"GoGraph $goR supersteps vs Default $defR")
  }

  test("CC over blocks matches union-find components") {
    val g = DiGraph.unweighted(12, Seq((0, 1), (1, 2), (3, 4), (6, 7), (7, 8), (10, 11)))
    val res = SparkBlockAsyncEngine.run(spark, g, CC, DefaultOrder.order(g), numBlocks = 3)
    assert(res.states.toSeq == References.components(g).toSeq)
  }

  test("block construction covers every vertex exactly once") {
    val g = GraphGen.rmat(50, 300, seed = 102)
    val o = VertexOrder.fromOrder(GraphGen.randomPermutation(50, seed = 103))
    val (ds, _) = SparkBlockAsyncEngine.blocks(spark, g, PageRank, o, 7)
    val vids = ds.collect().flatMap(_.vids)
    assert(vids.sorted.toSeq == (0 until 50))
    ds.unpersist()
  }

  test("blocks respect contiguous ordinal ranges") {
    val g = GraphGen.rmat(40, 200, seed = 104)
    val o = VertexOrder.fromOrder(GraphGen.randomPermutation(40, seed = 105))
    val (ds, _) = SparkBlockAsyncEngine.blocks(spark, g, PageRank, o, 4)
    ds.collect().foreach { b =>
      val positions = b.vids.map(o.pos(_))
      assert(positions.toSeq == positions.sorted.toSeq, "in-block order must follow ordinals")
      assert(positions.max - positions.min == positions.length - 1, "ordinals must be contiguous")
    }
    ds.unpersist()
  }
}
