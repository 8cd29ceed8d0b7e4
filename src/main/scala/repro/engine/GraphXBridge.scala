package repro.engine

import org.apache.spark.graphx.{Edge, EdgeDirection, Graph => XGraph, PartitionStrategy, VertexId}
import org.apache.spark.sql.SparkSession
import repro.graph.DiGraph
import repro.order.VertexOrder

/** Portability bridge: GoGraph reordering as a preprocessing step for
  * GraphX Pregel-style computation (the reproduction hint's target).
  *
  * Vertices are relabeled by ordinal number, and edges are partitioned by
  * contiguous ordinal ranges of the *destination* (the vertex whose state an
  * in-edge updates), so the block-async engine's locality carries over to
  * GraphX's edge partitions. Pregel itself is strictly BSP, so its superstep
  * count equals the synchronous engine's — the bridge demonstrates that the
  * reordering is a drop-in relabeling for a Pregel runtime, while the round
  * reduction is realized by [[SparkBlockAsyncEngine]] (which sweeps each
  * ordinal block in processing order).
  */
object GraphXBridge {

  /** Ordinal-block partition strategy: destination ordinal → block. */
  final case class OrdinalBlockStrategy(n: Long) extends PartitionStrategy {
    def getPartition(src: VertexId, dst: VertexId, numParts: Int): org.apache.spark.graphx.PartitionID =
      math.min(numParts - 1, (dst * numParts / math.max(1L, n)).toInt)
  }

  /** Build a GraphX graph whose vertex ids are ordinal numbers under `o`. */
  def relabeled(spark: SparkSession, g: DiGraph, o: VertexOrder, numParts: Int): XGraph[Double, Double] = {
    val sc = spark.sparkContext
    val es = sc.parallelize(
      g.edges.map { case (u, v, w) => Edge(o.pos(u).toLong, o.pos(v).toLong, w) },
      numParts)
    XGraph.fromEdges(es, defaultValue = 0.0)
      .partitionBy(OrdinalBlockStrategy(g.numVertices.toLong), numParts)
  }

  /** Pregel SSSP over the relabeled graph; returns (distances indexed by
    * original vertex id, supersteps until quiescence).
    */
  def ssspSupersteps(spark: SparkSession, g: DiGraph, o: VertexOrder,
                     source: Int, numParts: Int = 4): (Array[Double], Int) = {
    val graph = relabeled(spark, g, o, numParts)
    val src   = o.pos(source).toLong
    var cur   = graph.mapVertices((id, _) => if (id == src) 0.0 else Double.PositiveInfinity)
    var steps = 0
    var active = 1L
    while (active > 0) {
      val msgs = cur.aggregateMessages[Double](
        ctx => {
          val cand = ctx.srcAttr + ctx.attr
          if (cand < ctx.dstAttr) ctx.sendToDst(cand)
        },
        math.min,
      ).cache()
      active = msgs.count()
      if (active > 0) {
        cur = cur.joinVertices(msgs)((_, old, m) => math.min(old, m))
        steps += 1
      }
      msgs.unpersist(blocking = false)
    }
    val byOrdinal = cur.vertices.collect().toMap
    val out = Array.tabulate(g.numVertices)(v =>
      byOrdinal.getOrElse(o.pos(v).toLong, Double.PositiveInfinity))
    (out, steps + 1) // +1: the quiescence-detecting superstep, as elsewhere
  }
}
