package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ValInserterSpec extends AnyFunSuite {

  test("first insert with no neighbors starts the order") {
    val ins = new ValInserter(4)
    ins.insert(0, Seq.empty, Seq.empty)
    assert(ins.placed(0))
    assert(ins.size == 1)
    assert(ins.result().toSeq == Seq(0))
  }

  test("neighborless inserts append at the tail") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    ins.insert(2, Seq.empty, Seq.empty)
    assert(ins.result().toSeq == Seq(0, 1, 2))
  }

  test("all out-neighbors placed: node goes to the head") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    // 2 -> 0 and 2 -> 1: head makes both positive
    val pe = ins.insert(2, Seq.empty, Seq((0, 1.0), (1, 1.0)))
    assert(pe == 2.0)
    assert(ins.result().toSeq == Seq(2, 0, 1))
  }

  test("all in-neighbors placed: node goes to the tail") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    val pe = ins.insert(2, Seq((0, 1.0), (1, 1.0)), Seq.empty)
    assert(pe == 2.0)
    assert(ins.result().toSeq == Seq(0, 1, 2))
  }

  test("mixed neighbors: optimal middle position is found") {
    // order [a=0, b=1]; insert v=2 with in-edge a->v and out-edge v->b:
    // between a and b both edges are positive
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    val pe = ins.insert(2, Seq((0, 1.0)), Seq((1, 1.0)))
    assert(pe == 2.0)
    assert(ins.result().toSeq == Seq(0, 2, 1))
  }

  test("Fig 4 walkthrough: neighbor sequence [p,q,u], head wins the tie") {
    // O^c = [p, h, q, u]; edges (v,p),(q,v),(v,u) — pe: head 2, after p 1,
    // after q 2, after u 1; the earliest max (head) is kept
    val ins = new ValInserter(5) // p=0,h=1,q=2,u=3,v=4
    Seq(0, 1, 2, 3).foreach(ins.insert(_, Seq.empty, Seq.empty))
    val pe = ins.insert(4, Seq((2, 1.0)), Seq((0, 1.0), (3, 1.0)))
    assert(pe == 2.0)
    assert(ins.result().toSeq == Seq(4, 0, 1, 2, 3))
  }

  test("insert returns the achieved positive-edge count") {
    val ins = new ValInserter(4)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    ins.insert(2, Seq.empty, Seq.empty)
    // in from 0 and 2, out to 1: best is after 2 (tail): in-edges positive
    val pe = ins.insert(3, Seq((0, 1.0), (2, 1.0)), Seq((1, 1.0)))
    assert(pe == 2.0)
  }

  test("weighted neighbors (super-vertices) use edge weights in pe") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    // heavy out-edge to 0 (w=5), light in-edge from 1 (w=1):
    // head yields 5 positive, tail yields 1 — head wins
    val pe = ins.insert(2, Seq((1, 1.0)), Seq((0, 5.0)))
    assert(pe == 5.0)
    assert(ins.result().head == 2)
  }

  test("duplicate neighbor entries are aggregated") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq.empty, Seq.empty)
    // two parallel in-edges from 0: tail-ward position after 0
    val pe = ins.insert(2, Seq((0, 1.0), (0, 1.0)), Seq.empty)
    assert(pe == 2.0)
  }

  test("double insert of the same node is rejected") {
    val ins = new ValInserter(2)
    ins.insert(0, Seq.empty, Seq.empty)
    intercept[IllegalArgumentException] { ins.insert(0, Seq.empty, Seq.empty) }
  }

  test("unplaced neighbor references are rejected") {
    val ins = new ValInserter(3)
    ins.insert(0, Seq.empty, Seq.empty)
    intercept[IllegalArgumentException] { ins.insert(1, Seq((2, 1.0)), Seq.empty) }
  }

  test("seed places nodes in the given order") {
    val ins = new ValInserter(5)
    ins.seed(Seq(3, 1, 4))
    assert(ins.result().toSeq == Seq(3, 1, 4))
    assert(ins.size == 3)
  }

  test("seed then insert keeps relative seeded order") {
    val ins = new ValInserter(4)
    ins.seed(Seq(0, 1, 2))
    ins.insert(3, Seq((0, 1.0)), Seq((1, 1.0))) // between 0 and 1
    assert(ins.result().toSeq == Seq(0, 3, 1, 2))
  }

  test("deep nesting triggers renormalization without breaking the order") {
    // nodes 0 (head) and 1 (tail); each node i>1 has in-edge from 0 and
    // out-edge to node i-1 — forcing insertion between 0 and i-1, which
    // halves the val interval every time until renormalization kicks in
    val n   = 120
    val ins = new ValInserter(n)
    ins.insert(0, Seq.empty, Seq.empty)
    ins.insert(1, Seq((0, 1.0)), Seq.empty)
    (2 until n).foreach { i =>
      val pe = ins.insert(i, Seq((0, 1.0)), Seq((i - 1, 1.0)))
      assert(pe == 2.0, s"node $i should place both its edges positively")
    }
    val res = ins.result()
    assert(res.sorted.toSeq == (0 until n), "result must be a permutation")
    // every node i>=2 must sit after 0 and before i-1
    val pos = new Array[Int](n)
    res.zipWithIndex.foreach { case (v, p) => pos(v) = p }
    (2 until n).foreach { i =>
      assert(pos(0) < pos(i), s"node $i must follow node 0")
      assert(pos(i) < pos(i - 1), s"node $i must precede node ${i - 1}")
    }
  }

  test("Lemma 2: every insertion makes at least half its placed edges positive") {
    val rnd = new scala.util.Random(77)
    (0 until 20).foreach { _ =>
      val n   = 30
      val ins = new ValInserter(n)
      val placed = scala.collection.mutable.ArrayBuffer.empty[Int]
      (0 until n).foreach { v =>
        // random edges between v and already-placed vertices
        val inN  = placed.filter(_ => rnd.nextDouble() < 0.3).map(u => (u, 1.0)).toSeq
        val outN = placed.filter(_ => rnd.nextDouble() < 0.3).map(u => (u, 1.0)).toSeq
        val pe   = ins.insert(v, inN, outN)
        val ec   = inN.size + outN.size
        assert(pe >= ec / 2.0, s"pe=$pe < |E_v^c|/2=${ec / 2.0}")
        placed += v
      }
    }
  }

  test("valOf rejects unplaced nodes") {
    val ins = new ValInserter(2)
    intercept[IllegalArgumentException] { ins.valOf(0) }
  }
}
