package repro.engine

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.DiGraph
import repro.order.VertexOrder

/** Synchronous (Eq. 1) iterative engine on the DataFrame API.
  *
  * Each superstep is one Catalyst plan: messages = edges ⋈ states on src,
  * aggregated per dst with the program's fold; new states = old states
  * left-joined with messages through the program's apply expression.
  * Convergence is the per-round max |Δx| ≤ tol, evaluated as an aggregate.
  *
  * The per-program gather/apply are expressed as Columns (below) so the
  * whole superstep stays inside Catalyst; results and round counts are
  * validated against [[SeqEngine.sync]] in tests (Jacobi rounds are engine-
  * independent, so the counts must match exactly).
  */
object SparkSyncEngine {

  final case class SparkRunResult(states: DataFrame, rounds: Int, converged: Boolean)

  private val Inf = Double.PositiveInfinity

  /** (aggregate over msg column, apply(old=x, acc, id, source)) per program. */
  private def sql(prog: VertexProgram, source: Int): (Column => Column, (Column, Column, Column) => Column) =
    prog.name match {
      case "PageRank" =>
        val d = prog.asInstanceOf[PageRank].damping
        (m => sum(m), (x, acc, id) => lit(1.0 - d) + lit(d) * coalesce(acc, lit(0.0)))
      case "PHP" =>
        val c = prog.asInstanceOf[PHP].penalty
        (m => sum(m), (x, acc, id) =>
          when(id === source, 1.0).otherwise(lit(c) * coalesce(acc, lit(0.0))))
      case "SSSP" | "BFS" =>
        (m => min(m), (x, acc, id) => least(x, coalesce(acc, lit(Inf))))
      case "CC" =>
        (m => min(m), (x, acc, id) => least(x, coalesce(acc, lit(Inf))))
      case "SSWP" =>
        (m => max(m), (x, acc, id) =>
          when(id === source, x).otherwise(greatest(x, coalesce(acc, lit(0.0)))))
      case other => throw new IllegalArgumentException(s"no SQL translation for program '$other'")
    }

  /** The per-edge message value: state of src folded with weight/out-degree. */
  private def msgExpr(prog: VertexProgram): Column = prog.name match {
    case "PageRank" | "PHP" => col("x") / col("out_deg")
    case "SSSP"             => col("x") + col("weight")
    case "BFS"              => col("x") + lit(1.0)
    case "CC"               => col("x")
    case "SSWP"             => least(col("x"), col("weight"))
    case other => throw new IllegalArgumentException(s"no message expression for program '$other'")
  }

  /** Run until convergence; returns final states `(id: long, x: double)`. */
  def run(spark: SparkSession, g0: DiGraph, prog: VertexProgram,
          source: Int = -1, maxRounds: Int = 1000): SparkRunResult = {
    import spark.implicits._
    val g = SeqEngine.prepare(g0, prog)
    val n = g.numVertices

    val outDeg = Array.tabulate(n)(g.outDegree)
    val edges = g.edges
      .map { case (u, v, w) => (u.toLong, v.toLong, w, outDeg(u)) }
      .toDF("src", "dst", "weight", "out_deg")
      .cache()
    edges.count() // materialize once

    var states = (0 until n)
      .map(v => (v.toLong, prog.init(v, source)))
      .toDF("id", "x")
      .localCheckpoint()

    val (aggFn, applyFn) = sql(prog, source)
    var rounds    = 0
    var converged = false
    while (!converged && rounds < maxRounds) {
      val msgs = edges
        .join(states.withColumnRenamed("id", "src"), "src")
        .select(col("dst").as("id"), msgExpr(prog).as("m"))
        .groupBy("id")
        .agg(aggFn(col("m")).as("acc"))
      val next = states
        .join(msgs, Seq("id"), "left")
        .select(col("id"), applyFn(col("x"), col("acc"), col("id")).as("x_new"), col("x").as("x_old"))
        .localCheckpoint()
      // ∞ vs ∞ yields NaN — count as unchanged
      val maxDelta = next
        .agg(max(when(isnan(abs(col("x_new") - col("x_old"))), 0.0)
          .otherwise(abs(col("x_new") - col("x_old")))).as("d"))
        .head().getDouble(0)
      states = next.select(col("id"), col("x_new").as("x"))
      rounds += 1
      converged = maxDelta <= prog.tol
    }
    edges.unpersist()
    SparkRunResult(states, rounds, converged)
  }

  /** Collect states into an array indexed by vertex id. */
  def collectStates(res: SparkRunResult, n: Int): Array[Double] = {
    val out = new Array[Double](n)
    res.states.collect().foreach(r => out(r.getLong(0).toInt) = r.getDouble(1))
    out
  }
}
