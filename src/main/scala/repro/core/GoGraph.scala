package repro.core

import scala.collection.mutable
import repro.graph.DiGraph
import repro.order.{Reorder, VertexOrder}
import repro.partition.{Partitioner, RabbitPartition}

/** Configuration for [[GoGraphReorder]].
  *
  * @param hdFraction   fraction of vertices extracted as high-degree
  *                     (paper's rule of thumb: top 0.2%)
  * @param partitioner  divide-phase method (paper default: Rabbit-Partition)
  * @param targetPartSize advisory subgraph size handed to balanced
  *                     partitioners that need an explicit k
  */
final case class GoGraphConfig(
    hdFraction: Double = 0.002,
    partitioner: Partitioner = RabbitPartition,
    targetPartSize: Int = 1024,
)

/** GoGraph (the paper's contribution, Algorithm 1).
  *
  * Divide: extract the top `hdFraction` high-degree vertices and their edges;
  * vertices left with no remaining edges become isolated; the rest is split
  * into subgraphs by `partitioner`. Conquer: vertices inside each subgraph
  * are greedily inserted (BFS from the minimum-in-degree seed) at the
  * position maximizing the positive-edge count ([[ValInserter]]). Combine:
  * subgraphs become super-vertices whose edge weights are inter-subgraph
  * edge counts, ordered with the same insertion procedure; the super order is
  * spliced, then high-degree and finally isolated vertices are inserted into
  * the global order, again maximizing M(·).
  */
class GoGraphReorder(cfg: GoGraphConfig = GoGraphConfig()) extends Reorder {
  val name = "GoGraph"

  def order(g: DiGraph): VertexOrder = {
    val n = g.numVertices
    if (n == 0) return VertexOrder.identity(0)

    // ---- Divide: extract high-degree vertices ----
    val hdCount = math.min(n, math.max(1, math.round(n * cfg.hdFraction).toInt))
    val byDeg   = Array.tabulate(n)(identity).sortBy(v => (-g.degree(v), v))
    val isHd    = new Array[Boolean](n)
    // only vertices that actually have edges qualify as "high-degree"
    byDeg.take(hdCount).foreach(v => if (g.degree(v) > 0) isHd(v) = true)

    // residual degree after removing HD vertices and their edges
    val residDeg = new Array[Int](n)
    g.foreachEdge { (u, v, _) =>
      if (!isHd(u) && !isHd(v)) { residDeg(u) += 1; residDeg(v) += 1 }
    }
    val isIso = Array.tabulate(n)(v => !isHd(v) && residDeg(v) == 0)

    val rest = (0 until n).filter(v => !isHd(v) && !isIso(v)).toArray

    // ---- Divide: split the remaining graph G' into subgraphs ----
    val local  = new Array[Int](n) // global -> local id within G'
    rest.zipWithIndex.foreach { case (v, i) => local(v) = i }
    val gEdges = mutable.ArrayBuffer.empty[(Int, Int, Double)]
    g.foreachEdge { (u, v, w) =>
      if (!isHd(u) && !isIso(u) && !isHd(v) && !isIso(v)) gEdges += ((local(u), local(v), w))
    }
    val gPrime = DiGraph.fromEdges(rest.length, gEdges.toSeq)
    val k      = math.max(1, (rest.length + cfg.targetPartSize - 1) / cfg.targetPartSize)
    val labels = if (rest.isEmpty) Array.empty[Int] else cfg.partitioner.partition(gPrime, k)
    val numSub = if (rest.isEmpty) 0 else labels.max + 1

    // ---- Conquer: order vertices within each subgraph ----
    val subOrders = Array.fill(numSub)(Array.empty[Int]) // local ids, in order
    (0 until numSub).foreach { s =>
      val members = (0 until rest.length).filter(labels(_) == s)
      subOrders(s) = orderWithin(gPrime, members, labels, s)
    }

    // ---- Combine: order subgraphs as weighted super-vertices ----
    val superOrder = orderSupers(gPrime, labels, numSub)

    // splice: subgraph orders concatenated in super-vertex order
    // (Algorithm 1 lines 21–29: adding the previous subgraph's max val is
    // exactly concatenation once vals are normalized to ranks)
    val ins = new ValInserter(n)
    superOrder.foreach(s => ins.seed(subOrders(s).iterator.map(rest(_))))

    // ---- Insert high-degree, then isolated vertices (lines 30–35) ----
    val hdVerts = byDeg.filter(isHd(_)) // descending degree
    hdVerts.foreach(v => insertGlobal(g, ins, v))
    val isoVerts = (0 until n).filter(isIso(_))
    isoVerts.foreach(v => insertGlobal(g, ins, v))

    VertexOrder.fromOrder(ins.result())
  }

  /** Insert `v` into the global order using its placed neighbors in `g`. */
  private def insertGlobal(g: DiGraph, ins: ValInserter, v: Int): Unit = {
    val inN  = g.inNeighbors(v).filter(u => u != v && ins.placed(u)).map(u => (u, 1.0))
    val outN = g.outNeighbors(v).filter(u => u != v && ins.placed(u)).map(u => (u, 1.0))
    ins.insert(v, inN, outN)
  }

  /** Order the members of subgraph `s` of `gPrime`: BFS candidate stream
    * from the minimum-in-degree seed, greedy optimal-position insertion.
    * Returns local ids in processing order.
    */
  private def orderWithin(gPrime: DiGraph, members: Seq[Int], labels: Array[Int], s: Int): Array[Int] = {
    if (members.isEmpty) return Array.empty
    val ins     = new ValInserter(gPrime.numVertices)
    val visited = mutable.HashSet.empty[Int]
    val queue   = mutable.Queue.empty[Int]
    def inDegWithin(v: Int): Int = gPrime.inNeighbors(v).count(labels(_) == s)
    val seeds = members.sortBy(v => (inDegWithin(v), v))

    seeds.foreach { seed =>
      if (!visited.contains(seed)) {
        visited += seed; queue.enqueue(seed)
        while (queue.nonEmpty) {
          val v = queue.dequeue()
          val inN = gPrime.inNeighbors(v)
            .filter(u => labels(u) == s && ins.placed(u)).map(u => (u, 1.0))
          val outN = gPrime.outNeighbors(v)
            .filter(u => labels(u) == s && ins.placed(u)).map(u => (u, 1.0))
          ins.insert(v, inN, outN)
          val visit = (u: Int) =>
            if (labels(u) == s && !visited.contains(u)) { visited += u; queue.enqueue(u) }
          gPrime.outNeighbors(v).foreach(visit)
          gPrime.inNeighbors(v).foreach(visit)
        }
      }
    }
    ins.result()
  }

  /** Order super-vertices: weighted GetOptVal insertion, BFS candidate
    * stream from the minimum weighted-in-degree super-vertex.
    */
  private def orderSupers(gPrime: DiGraph, labels: Array[Int], numSub: Int): Array[Int] = {
    if (numSub == 0) return Array.empty
    if (numSub == 1) return Array(0)
    // inter-subgraph edge weights w(si -> sj), i != j
    val w = mutable.HashMap.empty[(Int, Int), Double]
    gPrime.foreachEdge { (u, v, _) =>
      val (su, sv) = (labels(u), labels(v))
      if (su != sv) w.update((su, sv), w.getOrElse((su, sv), 0.0) + 1.0)
    }
    val outAdj = Array.fill(numSub)(mutable.ArrayBuffer.empty[(Int, Double)])
    val inAdj  = Array.fill(numSub)(mutable.ArrayBuffer.empty[(Int, Double)])
    w.foreach { case ((si, sj), wt) => outAdj(si) += ((sj, wt)); inAdj(sj) += ((si, wt)) }

    val ins     = new ValInserter(numSub)
    val visited = mutable.HashSet.empty[Int]
    val queue   = mutable.Queue.empty[Int]
    def wInDeg(s: Int): Double = inAdj(s).map(_._2).sum
    val seeds = (0 until numSub).sortBy(s => (wInDeg(s), s.toDouble))

    seeds.foreach { seed =>
      if (!visited.contains(seed)) {
        visited += seed; queue.enqueue(seed)
        while (queue.nonEmpty) {
          val sv = queue.dequeue()
          ins.insert(sv,
            inAdj(sv).filter(p => ins.placed(p._1)).toSeq,
            outAdj(sv).filter(p => ins.placed(p._1)).toSeq)
          val visit = (p: (Int, Double)) =>
            if (!visited.contains(p._1)) { visited += p._1; queue.enqueue(p._1) }
          outAdj(sv).foreach(visit)
          inAdj(sv).foreach(visit)
        }
      }
    }
    ins.result()
  }
}

/** Default-configuration GoGraph (top 0.2% HD, Rabbit-Partition divide). */
object GoGraph extends GoGraphReorder(GoGraphConfig())
