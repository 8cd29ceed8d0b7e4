package repro.graph

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** Compact immutable directed graph in CSR form (both directions).
  *
  * Vertices are dense ints `0 until numVertices`. Parallel edges are allowed
  * (the reordering metric counts edges, not neighbor pairs); self-loops are
  * dropped at construction (they are order-invariant and the paper's metric
  * ignores them — p(u) < p(u) is never true).
  *
  * This is the driver-side substrate for the reordering algorithms, which are
  * inherently sequential preprocessing; the iterative engines consume the
  * same edges as a Spark DataFrame via [[DiGraph.edgesDF]].
  */
final class DiGraph private[graph] (
    val numVertices: Int,
    private val outOff: Array[Int],
    private val outAdj: Array[Int],
    private val outWgt: Array[Double],
    private val inOff: Array[Int],
    private val inAdj: Array[Int],
    private val inWgt: Array[Double],
) extends Serializable {

  /** Number of directed edges (parallel edges counted, self-loops excluded). */
  def numEdges: Int = outAdj.length

  def outDegree(v: Int): Int = outOff(v + 1) - outOff(v)
  def inDegree(v: Int): Int  = inOff(v + 1) - inOff(v)

  /** Total degree = in + out (parallel edges counted). */
  def degree(v: Int): Int = outDegree(v) + inDegree(v)

  /** Out-neighbors of `v`, with multiplicity. */
  def outNeighbors(v: Int): IndexedSeq[Int] =
    new IndexedSeq[Int] {
      private val s            = outOff(v)
      def length: Int          = outOff(v + 1) - s
      def apply(i: Int): Int   = outAdj(s + i)
    }

  /** In-neighbors of `v`, with multiplicity. */
  def inNeighbors(v: Int): IndexedSeq[Int] =
    new IndexedSeq[Int] {
      private val s            = inOff(v)
      def length: Int          = inOff(v + 1) - s
      def apply(i: Int): Int   = inAdj(s + i)
    }

  /** Weight of the i-th in-edge of `v` (aligned with [[inNeighbors]]). */
  def inWeight(v: Int, i: Int): Double = inWgt(inOff(v) + i)

  /** Weight of the i-th out-edge of `v` (aligned with [[outNeighbors]]). */
  def outWeight(v: Int, i: Int): Double = outWgt(outOff(v) + i)

  /** Apply `f(src, dst, weight)` to every edge. */
  def foreachEdge(f: (Int, Int, Double) => Unit): Unit = {
    var u = 0
    while (u < numVertices) {
      var i = outOff(u)
      while (i < outOff(u + 1)) { f(u, outAdj(i), outWgt(i)); i += 1 }
      u += 1
    }
  }

  /** All edges as (src, dst, weight) triples. */
  def edges: Seq[(Int, Int, Double)] = {
    val b = Seq.newBuilder[(Int, Int, Double)]
    b.sizeHint(numEdges)
    foreachEdge((u, v, w) => b += ((u, v, w)))
    b.result()
  }

  /** Graph with every vertex id `v` replaced by `perm(v)`; same topology. */
  def relabel(perm: Array[Int]): DiGraph = {
    require(perm.length == numVertices, s"perm size ${perm.length} != $numVertices")
    val es = new Array[(Int, Int, Double)](numEdges)
    var k  = 0
    foreachEdge { (u, v, w) => es(k) = (perm(u), perm(v), w); k += 1 }
    DiGraph.fromEdges(numVertices, es.toIndexedSeq)
  }

  /** Edge list as a DataFrame `(src: long, dst: long, weight: double)`. */
  def edgesDF(spark: SparkSession): DataFrame = {
    val rows = new java.util.ArrayList[Row](numEdges)
    foreachEdge((u, v, w) => rows.add(Row(u.toLong, v.toLong, w)))
    spark.createDataFrame(
      rows,
      StructType(Seq(
        StructField("src", LongType, nullable = false),
        StructField("dst", LongType, nullable = false),
        StructField("weight", DoubleType, nullable = false),
      )),
    )
  }
}

object DiGraph {

  /** Build from an edge triple list; self-loops dropped, endpoints validated. */
  def fromEdges(numVertices: Int, es: Seq[(Int, Int, Double)]): DiGraph = {
    require(numVertices >= 0, "numVertices must be >= 0")
    val kept = es.filter { case (u, v, _) => u != v }
    kept.foreach { case (u, v, _) =>
      require(u >= 0 && u < numVertices && v >= 0 && v < numVertices,
        s"edge ($u,$v) out of range [0,$numVertices)")
    }
    val m      = kept.size
    val outOff = new Array[Int](numVertices + 1)
    val inOff  = new Array[Int](numVertices + 1)
    kept.foreach { case (u, v, _) => outOff(u + 1) += 1; inOff(v + 1) += 1 }
    var i = 0
    while (i < numVertices) { outOff(i + 1) += outOff(i); inOff(i + 1) += inOff(i); i += 1 }
    val outAdj = new Array[Int](m); val outW = new Array[Double](m)
    val inAdj  = new Array[Int](m); val inW  = new Array[Double](m)
    val oc     = outOff.clone(); val ic = inOff.clone()
    kept.foreach { case (u, v, w) =>
      outAdj(oc(u)) = v; outW(oc(u)) = w; oc(u) += 1
      inAdj(ic(v))  = u; inW(ic(v))  = w; ic(v) += 1
    }
    new DiGraph(numVertices, outOff, outAdj, outW, inOff, inAdj, inW)
  }

  /** Unweighted convenience builder (all weights 1.0). */
  def unweighted(numVertices: Int, es: Seq[(Int, Int)]): DiGraph =
    fromEdges(numVertices, es.map { case (u, v) => (u, v, 1.0) })

  /** Build from a DataFrame with columns src, dst and optional weight.
    * Vertex ids must be dense `0 until numVertices`.
    */
  def fromDF(df: DataFrame, numVertices: Int): DiGraph = {
    val hasW = df.columns.contains("weight")
    val es = df.collect().toIndexedSeq.map { r =>
      val u = r.getAs[Any]("src") match { case l: Long => l.toInt; case i: Int => i }
      val v = r.getAs[Any]("dst") match { case l: Long => l.toInt; case i: Int => i }
      val w = if (hasW) r.getAs[Double]("weight") else 1.0
      (u, v, w)
    }
    fromEdges(numVertices, es)
  }
}
