package repro.order

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{DiGraph, GraphGen}

class GorderSpec extends AnyFunSuite {

  test("returns a permutation on random graphs") {
    val g = GraphGen.rmat(300, 2400, seed = 30)
    val o = Gorder.order(g)
    assert(o.order.sorted.toSeq == (0 until 300))
  }

  test("handles the empty graph") {
    assert(Gorder.order(DiGraph.unweighted(0, Seq.empty)).n == 0)
  }

  test("handles an edgeless graph") {
    val o = Gorder.order(DiGraph.unweighted(6, Seq.empty))
    assert(o.order.sorted.toSeq == (0 until 6))
  }

  test("handles a single vertex") {
    val o = Gorder.order(DiGraph.unweighted(1, Seq.empty))
    assert(o.order.toSeq == Seq(0))
  }

  test("neighbors of the start vertex follow it closely on a star") {
    val g = DiGraph.unweighted(6, Seq((0, 1), (0, 2), (0, 3), (0, 4), (0, 5)))
    val o = Gorder.order(g)
    assert(o.order(0) == 0, "highest-degree vertex seeds the order")
  }

  test("keeps the two halves of a disconnected pair of cliques contiguous") {
    // clique A = {0,1,2}, clique B = {3,4,5} (directed both ways)
    val ed = for {
      s <- Seq(Seq(0, 1, 2), Seq(3, 4, 5)); u <- s; v <- s if u != v
    } yield (u, v)
    val g = DiGraph.unweighted(6, ed)
    val o = Gorder.order(g)
    val posA = Seq(0, 1, 2).map(o.pos(_))
    val posB = Seq(3, 4, 5).map(o.pos(_))
    // one clique fully precedes the other
    assert(posA.max < posB.min || posB.max < posA.min,
      s"cliques interleaved: A=$posA B=$posB")
  }

  test("average neighbor distance beats a random order on a community graph") {
    val g = communityGraph(seed = 31)
    val go = Gorder.order(g)
    val ro = VertexOrder.fromOrder(GraphGen.randomPermutation(g.numVertices, seed = 32))
    assert(avgNeighborDist(g, go) < avgNeighborDist(g, ro),
      "Gorder should improve locality over a random order")
  }

  test("is deterministic") {
    val g = GraphGen.rmat(200, 1500, seed = 33)
    assert(Gorder.order(g).order.toSeq == Gorder.order(g).order.toSeq)
  }

  test("window size 1 still yields a permutation") {
    val g = GraphGen.rmat(100, 600, seed = 34)
    val o = new Gorder(window = 1).order(g)
    assert(o.order.sorted.toSeq == (0 until 100))
  }

  private def communityGraph(seed: Long): DiGraph = {
    val rnd = new scala.util.Random(seed)
    val es = for {
      c <- 0 until 10
      _ <- 0 until 120
    } yield {
      val base = c * 30
      (base + rnd.nextInt(30), base + rnd.nextInt(30))
    }
    DiGraph.unweighted(300, es.filter(e => e._1 != e._2))
  }

  private def avgNeighborDist(g: DiGraph, o: VertexOrder): Double = {
    var sum = 0.0; var cnt = 0L
    g.foreachEdge((u, v, _) => { sum += math.abs(o.pos(u) - o.pos(v)); cnt += 1 })
    if (cnt == 0) 0.0 else sum / cnt
  }
}
