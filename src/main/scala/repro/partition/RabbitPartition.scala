package repro.partition

import scala.collection.mutable
import repro.graph.DiGraph

/** Rabbit-Partition (Arai et al., IPDPS'16) — GoGraph's default divide step.
  *
  * Single-pass incremental community aggregation over the undirected view:
  * vertices are visited in ascending-degree order and each is merged into the
  * neighboring community with the largest positive modularity gain
  * ΔQ ∝ w(v,C)/(2m) − deg(v)·deg(C)/(2m)², tracked with union-find.
  */
object RabbitPartition extends Partitioner {
  val name = "Rabbit"

  def partition(g: DiGraph, k: Int): Array[Int] = {
    val n = g.numVertices
    if (n == 0) return Array.empty
    val m2 = 2.0 * g.numEdges // undirected degree mass
    if (g.numEdges == 0) return Array.tabulate(n)(identity)

    val parent = Array.tabulate(n)(identity)
    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != r) { val nx = parent(c); parent(c) = r; c = nx }
      r
    }
    // community total (undirected) degree
    val commDeg = Array.tabulate(n)(v => g.degree(v).toDouble)

    val visitOrder = Array.tabulate(n)(identity).sortBy(v => (g.degree(v), v))
    val wTo = mutable.HashMap.empty[Int, Double]
    visitOrder.foreach { v =>
      val rv = find(v)
      wTo.clear()
      val addNbr = (u: Int) => {
        val ru = find(u)
        if (ru != rv) wTo.update(ru, wTo.getOrElse(ru, 0.0) + 1.0)
      }
      g.outNeighbors(v).foreach(addNbr)
      g.inNeighbors(v).foreach(addNbr)
      if (wTo.nonEmpty) {
        val dv = g.degree(v).toDouble
        var bestC = -1; var bestGain = 0.0
        wTo.foreach { case (c, w) =>
          val gain = w / m2 - dv * commDeg(c) / (m2 * m2)
          if (gain > bestGain || (gain == bestGain && bestC != -1 && c < bestC)) {
            bestGain = gain; bestC = c
          }
        }
        if (bestC != -1 && bestGain > 0.0) {
          parent(rv) = bestC
          commDeg(bestC) += commDeg(rv)
        }
      }
    }
    Partitioner.compact(Array.tabulate(n)(find))
  }
}
