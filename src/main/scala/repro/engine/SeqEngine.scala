package repro.engine

import repro.graph.DiGraph
import repro.order.VertexOrder

/** Result of one iterative run.
  *
  * `rounds` counts full sweeps executed, *including* the sweep that observed
  * convergence — this reproduces the paper's Fig 2 counts (sync SSSP on the
  * 5-vertex example: 4; async: 3; async + reorder: 2).
  */
final case class RunResult(states: Array[Double], rounds: Int, converged: Boolean) {
  /** Σ of finite state values (used by the convergence-distance experiments). */
  def finiteSum: Double = {
    var s = 0.0; var i = 0
    while (i < states.length) { val x = states(i); if (!x.isInfinite && !x.isNaN) s += x; i += 1 }
    s
  }
}

/** Exact sequential engine: Eq. 1 (synchronous / Jacobi) and Eq. 2
  * (asynchronous Gauss–Seidel in a given processing order). This is the
  * reference implementation the Spark engines are validated against, and the
  * engine that measures iteration rounds exactly as the paper defines them.
  */
object SeqEngine {

  /** Symmetrize if the program requires it (CC). */
  def prepare(g: DiGraph, prog: VertexProgram): DiGraph =
    if (prog.needsSymmetric) symmetrize(g) else g

  /** Graph with each edge mirrored (weights preserved). */
  def symmetrize(g: DiGraph): DiGraph = {
    val es = Seq.newBuilder[(Int, Int, Double)]
    es.sizeHint(2 * g.numEdges)
    g.foreachEdge { (u, v, w) => es += ((u, v, w)); es += ((v, u, w)) }
    DiGraph.fromEdges(g.numVertices, es.result())
  }

  private def delta(a: Double, b: Double): Double = {
    val d = math.abs(a - b)
    if (d.isNaN) 0.0 else d // ∞ vs ∞ — unchanged
  }

  /** Synchronous iteration (Eq. 1): every vertex reads previous-round states. */
  def sync(g0: DiGraph, prog: VertexProgram, source: Int = -1, maxRounds: Int = 100000): RunResult = {
    val g      = prepare(g0, prog)
    val n      = g.numVertices
    val outDeg = Array.tabulate(n)(g.outDegree)
    var x      = Array.tabulate(n)(v => prog.init(v, source))
    var xNew   = new Array[Double](n)
    var rounds = 0
    var converged = false
    while (!converged && rounds < maxRounds) {
      var maxDelta = 0.0
      var v = 0
      while (v < n) {
        var acc = prog.identity
        val inN = g.inNeighbors(v)
        val nIn = inN.length
        var i = 0
        while (i < nIn) {
          val u = inN(i)
          acc = prog.gather(acc, x(u), g.inWeight(v, i), outDeg(u))
          i += 1
        }
        val nx = prog.apply(v, x(v), acc, source)
        val d  = delta(nx, x(v))
        if (d > maxDelta) maxDelta = d
        xNew(v) = nx
        v += 1
      }
      val t = x; x = xNew; xNew = t
      rounds += 1
      converged = maxDelta <= prog.tol
    }
    RunResult(x, rounds, converged)
  }

  /** Asynchronous iteration (Eq. 2): vertices processed in `order`; each
    * reads current-round states of earlier-ordinal in-neighbors and
    * previous-round states of later ones (in-place array sweep).
    */
  def async(g0: DiGraph, prog: VertexProgram, order: VertexOrder,
            source: Int = -1, maxRounds: Int = 100000): RunResult = {
    val g = prepare(g0, prog)
    val n = g.numVertices
    require(order.n == n, s"order size ${order.n} != |V|=$n")
    val outDeg = Array.tabulate(n)(g.outDegree)
    val x      = Array.tabulate(n)(v => prog.init(v, source))
    var rounds = 0
    var converged = false
    while (!converged && rounds < maxRounds) {
      var maxDelta = 0.0
      var p = 0
      while (p < n) {
        val v   = order.order(p)
        var acc = prog.identity
        val inN = g.inNeighbors(v)
        val nIn = inN.length
        var i = 0
        while (i < nIn) {
          val u = inN(i)
          acc = prog.gather(acc, x(u), g.inWeight(v, i), outDeg(u))
          i += 1
        }
        val nx = prog.apply(v, x(v), acc, source)
        val d  = delta(nx, x(v))
        if (d > maxDelta) maxDelta = d
        x(v) = nx
        p += 1
      }
      rounds += 1
      converged = maxDelta <= prog.tol
    }
    RunResult(x, rounds, converged)
  }
}
