package repro.engine

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.graph.DiGraph
import repro.order.VertexOrder

/** One contiguous ordinal block: vertices in processing order with their
  * in-adjacency in CSR form (`off`/`adj`/`wgt` aligned with `vids`).
  */
final case class Block(
    bid: Int,
    vids: Array[Int],
    off: Array[Int],
    adj: Array[Int],
    wgt: Array[Double],
)

/** Distributed adaptation of the paper's asynchronous mode (Eq. 2).
  *
  * The processing order is cut into `numBlocks` contiguous ordinal ranges,
  * one per Spark task. Within a superstep, each block runs a sequential
  * Gauss–Seidel sweep over its vertices *in processing order*, reading
  * current-superstep states for in-block in-neighbors already updated this
  * sweep and previous-superstep states (broadcast) for everything else.
  * Cross-block states synchronize once per superstep.
  *
  * This interpolates exactly between the paper's two modes — identities
  * verified in tests:
  *   - `numBlocks = 1`  ⇒ rounds equal [[SeqEngine.async]] (pure Eq. 2);
  *   - `numBlocks = |V|` ⇒ rounds equal [[SeqEngine.sync]]  (pure Eq. 1).
  * A better order (more positive edges *inside* blocks) ⇒ fewer supersteps,
  * which is how GoGraph's preprocessing pays off on a Pregel-style runtime.
  */
object SparkBlockAsyncEngine {

  /** Build the block dataset for (graph, order, numBlocks). */
  def blocks(spark: SparkSession, g0: DiGraph, prog: VertexProgram,
             order: VertexOrder, numBlocks: Int): (Dataset[Block], DiGraph) = {
    import spark.implicits._
    val g = SeqEngine.prepare(g0, prog)
    val n = g.numVertices
    require(order.n == n, s"order size ${order.n} != |V|=$n")
    val nb = math.max(1, math.min(numBlocks, math.max(1, n)))

    val bs = (0 until nb).map { b =>
      val lo = (b.toLong * n / nb).toInt
      val hi = ((b + 1).toLong * n / nb).toInt
      val vids = java.util.Arrays.copyOfRange(order.order, lo, hi)
      val off  = new Array[Int](vids.length + 1)
      var i = 0
      while (i < vids.length) { off(i + 1) = off(i) + g.inDegree(vids(i)); i += 1 }
      val adj = new Array[Int](off(vids.length))
      val wgt = new Array[Double](off(vids.length))
      i = 0
      while (i < vids.length) {
        val v   = vids(i)
        val inN = g.inNeighbors(v)
        var j = 0
        while (j < inN.length) {
          adj(off(i) + j) = inN(j)
          wgt(off(i) + j) = g.inWeight(v, j)
          j += 1
        }
        i += 1
      }
      Block(b, vids, off, adj, wgt)
    }
    (spark.createDataset(bs).repartition(nb).cache(), g)
  }

  /** Run to convergence; states returned indexed by vertex id. */
  def run(spark: SparkSession, g0: DiGraph, prog: VertexProgram, order: VertexOrder,
          source: Int = -1, numBlocks: Int = 16, maxRounds: Int = 100000): RunResult = {
    val (ds, g) = blocks(spark, g0, prog, order, numBlocks)
    try runOnBlocks(spark, ds, g, prog, order, source, maxRounds)
    finally ds.unpersist()
  }

  private[engine] def runOnBlocks(spark: SparkSession, ds: Dataset[Block], g: DiGraph,
                                  prog: VertexProgram, order: VertexOrder,
                                  source: Int, maxRounds: Int): RunResult = {
    import spark.implicits._
    val n      = g.numVertices
    val outDeg = Array.tabulate(n)(g.outDegree)
    val bcDeg  = spark.sparkContext.broadcast(outDeg)
    var x      = Array.tabulate(n)(v => prog.init(v, source))
    var rounds = 0
    var converged = false
    while (!converged && rounds < maxRounds) {
      val bcX = spark.sparkContext.broadcast(x)
      val swept: Array[(Array[Int], Array[Double], Double)] = ds
        .map { blk =>
          val prev  = bcX.value
          val degs  = bcDeg.value
          // local copy: in-block vertices read updated values once processed
          val local = new java.util.HashMap[Int, java.lang.Double]()
          var maxDelta = 0.0
          val out = new Array[Double](blk.vids.length)
          var i = 0
          while (i < blk.vids.length) {
            val v   = blk.vids(i)
            var acc = prog.identity
            var j = blk.off(i)
            while (j < blk.off(i + 1)) {
              val u  = blk.adj(j)
              val lu = local.get(u)
              val xu = if (lu ne null) lu.doubleValue() else prev(u)
              acc = prog.gather(acc, xu, blk.wgt(j), degs(u))
              j += 1
            }
            val old = { val lv = local.get(v); if (lv ne null) lv.doubleValue() else prev(v) }
            val nx  = prog.apply(v, old, acc, source)
            val d   = { val dd = math.abs(nx - old); if (dd.isNaN) 0.0 else dd }
            if (d > maxDelta) maxDelta = d
            local.put(v, nx)
            out(i) = nx
            i += 1
          }
          (blk.vids, out, maxDelta)
        }
        .collect()
      bcX.destroy()
      val next = x.clone()
      var maxDelta = 0.0
      swept.foreach { case (vids, vals, d) =>
        if (d > maxDelta) maxDelta = d
        var i = 0
        while (i < vids.length) { next(vids(i)) = vals(i); i += 1 }
      }
      x = next
      rounds += 1
      converged = maxDelta <= prog.tol
    }
    bcDeg.destroy()
    RunResult(x, rounds, converged)
  }
}
