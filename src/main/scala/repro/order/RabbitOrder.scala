package repro.order

import scala.collection.mutable
import repro.graph.DiGraph
import repro.partition.{Partitioner, RabbitPartition}

/** Rabbit Order (Arai et al., IPDPS'16) — locality-first reordering.
  *
  * Communities from the incremental-aggregation pass ([[RabbitPartition]])
  * are laid out contiguously (the original walks the merge dendrogram
  * depth-first; laying each flat community out along a BFS is the same
  * cache-level effect). Communities appear in order of their smallest member
  * id; members follow a BFS from the community's lowest-degree vertex, so
  * tightly connected vertices land on nearby subscripts.
  */
object RabbitOrder extends Reorder {
  val name = "Rabbit"

  def order(g: DiGraph): VertexOrder = {
    val n = g.numVertices
    if (n == 0) return VertexOrder.identity(0)
    val labels  = RabbitPartition.partition(g, 0)
    val byComm  = (0 until n).groupBy(labels(_))
    val commSeq = byComm.toSeq.sortBy { case (_, vs) => vs.min }
    val out     = new Array[Int](n)
    var i       = 0
    commSeq.foreach { case (_, vs) =>
      bfsWithin(g, vs).foreach { v => out(i) = v; i += 1 }
    }
    VertexOrder.fromOrder(out)
  }

  /** BFS over the undirected view restricted to `vs`, lowest-degree seed. */
  private[order] def bfsWithin(g: DiGraph, vs: Seq[Int]): Seq[Int] = {
    val inSet   = vs.toSet
    val visited = mutable.HashSet.empty[Int]
    val order   = mutable.ArrayBuffer.empty[Int]
    val queue   = mutable.Queue.empty[Int]
    val seeds   = vs.sortBy(v => (g.degree(v), v))
    seeds.foreach { seed =>
      if (!visited.contains(seed)) {
        queue.enqueue(seed); visited += seed
        while (queue.nonEmpty) {
          val v = queue.dequeue()
          order += v
          val visit = (u: Int) =>
            if (inSet.contains(u) && !visited.contains(u)) { visited += u; queue.enqueue(u) }
          g.outNeighbors(v).foreach(visit)
          g.inNeighbors(v).foreach(visit)
        }
      }
    }
    order.toSeq
  }
}
