package repro.cache

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{DiGraph, GraphGen}
import repro.order.{DefaultOrder, RabbitOrder, VertexOrder}

class CacheSimSpec extends AnyFunSuite {

  test("config validates line/state divisibility") {
    intercept[IllegalArgumentException] { CacheConfig(lineBytes = 64, stateBytes = 7) }
    assert(CacheConfig().statesPerLine == 8)
  }

  test("edgeless sweep touches each state once: misses = lines touched") {
    val g = DiGraph.unweighted(64, Seq.empty)
    val st = CacheSim.sweep(g, DefaultOrder.order(g))
    assert(st.accesses == 64)
    assert(st.misses == 64 / 8, "one compulsory miss per 8-state line")
  }

  test("accesses = |V| + |E| for one sweep") {
    val g = GraphGen.rmat(100, 700, seed = 120)
    val st = CacheSim.sweep(g, DefaultOrder.order(g))
    assert(st.accesses == 100L + 700L)
  }

  test("a chain in processing order is nearly all hits after compulsory misses") {
    val g = DiGraph.unweighted(80, (0 until 79).map(i => (i, i + 1)))
    val st = CacheSim.sweep(g, DefaultOrder.order(g))
    assert(st.misses == 10, s"only compulsory misses expected, got ${st.misses}")
  }

  test("a working set larger than the cache with random order misses heavily") {
    // tiny cache: 4 sets x 2 ways x 8 states = 64 resident states
    val cfg = CacheConfig(numSets = 4, ways = 2)
    val g = GraphGen.erdosRenyi(2000, 10000, seed = 121)
    val rand = VertexOrder.fromOrder(GraphGen.randomPermutation(2000, seed = 122))
    val st = CacheSim.sweep(g, rand, cfg)
    assert(st.missRate > 0.5, s"expected heavy misses, got ${st.missRate}")
  }

  test("locality-aware order misses less than a random order (Fig 9 shape)") {
    val cfg = CacheConfig(numSets = 8, ways = 2)
    // planted communities, shuffled ids
    val rnd = new scala.util.Random(123)
    val es = for { c <- 0 until 20; _ <- 0 until 100 } yield {
      val b = c * 40; (b + rnd.nextInt(40), b + rnd.nextInt(40))
    }
    val g = GraphGen.shuffleIds(DiGraph.unweighted(800, es.filter(e => e._1 != e._2)), seed = 124)
    val randMiss   = CacheSim.sweep(g, VertexOrder.fromOrder(GraphGen.randomPermutation(800, 125)), cfg).misses
    val rabbitMiss = CacheSim.sweep(g, RabbitOrder.order(g), cfg).misses
    assert(rabbitMiss < randMiss, s"rabbit=$rabbitMiss rand=$randMiss")
  }

  test("LRU evicts the least recently used way") {
    // 1 set, 2 ways, 1 state per line: classic LRU stack behaviour
    val cfg = CacheConfig(lineBytes = 8, stateBytes = 8, numSets = 1, ways = 2)
    // graph with in-edges forcing accesses 0,1,0,2,1 — a textbook LRU trace
    // order [a,b]; a has in-nbrs {}, just checks the plumbing via a tiny graph
    val g = DiGraph.unweighted(3, Seq((0, 2), (1, 2)))
    val st = CacheSim.sweep(g, DefaultOrder.order(g), cfg)
    // trace: 0(miss) 1(miss) 2(miss, evict 0) 0(miss, evict 1) 1(miss)
    assert(st.accesses == 5)
    assert(st.misses == 5)
  }

  test("sweep rejects mismatched order size") {
    val g = DiGraph.unweighted(4, Seq((0, 1)))
    intercept[IllegalArgumentException] { CacheSim.sweep(g, VertexOrder.identity(3)) }
  }

  test("miss rate is between 0 and 1") {
    val g = GraphGen.rmat(200, 1000, seed = 126)
    val st = CacheSim.sweep(g, DefaultOrder.order(g))
    assert(st.missRate >= 0.0 && st.missRate <= 1.0)
  }
}
