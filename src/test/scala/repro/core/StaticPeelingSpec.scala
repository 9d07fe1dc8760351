package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StaticPeelingSpec extends AnyFunSuite {
  import TestUtil._

  private def graphOf(txs: Seq[Tx], metric: Suspiciousness = Suspiciousness.DW): DynGraph =
    loadedSpade(metric, txs).graph

  test("paper running example: O = [u1, u3, u2, u4, u5] (Fig. 3 / Example 2.1)") {
    val o = StaticPeeling.peel(graphOf(paperEdges))
    assert(o.toVertexSeq == Seq(0, 2, 1, 3, 4))
    // Peel-time weights: u1 leaves with 2 (its edge to u2), u3 with 2.6,
    // u2 with the remaining edge to u4 (1.0), u4 with 6 (edge to u5 alive),
    // u5 with 0.
    assert(o.toWeightSeq.zip(Seq(2.0, 2.6, 1.0, 6.0, 0.0)).forall { case (a, b) => math.abs(a - b) < 1e-9 })
  }

  test("detect on the running example returns the {u4, u5} pair") {
    val c = StaticPeeling.detect(graphOf(paperEdges))
    // suffix densities: whole graph 11.6/5 = 2.32; after u1: 9.6/4 = 2.4;
    // after u3: 7/3 ≈ 2.33; {u4,u5}: 6/2 = 3 — the densest.
    assert(c.memberSet == Set(3, 4))
    assert(math.abs(c.density - 3.0) < 1e-9)
  }

  test("empty graph peels to an empty order") {
    val o = StaticPeeling.peel(new DynGraph())
    assert(o.length == 0)
    assert(o.detect().size == 0)
  }

  test("isolated vertices peel first, by id") {
    val g = new DynGraph()
    g.ensureVertex(5)
    g.addEdge(1, 2, 1.0)
    val o = StaticPeeling.peel(g)
    assert(o.toVertexSeq.take(4) == Seq(0, 3, 4, 5))
  }

  test("a clique plus a pendant path: detect returns the clique") {
    val g = new DynGraph()
    // 4-clique (directed arbitrary) with weight 1 edges
    val clique = Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3))
    clique.foreach { case (a, b) => g.addEdge(a, b, 1.0) }
    // pendant path 3 -> 4 -> 5
    g.addEdge(3, 4, 1.0); g.addEdge(4, 5, 1.0)
    val c = StaticPeeling.detect(g)
    assert(c.memberSet == Set(0, 1, 2, 3))
    assert(math.abs(c.density - 6.0 / 4) < 1e-9)
  }

  test("two equally dense blocks are returned together (tie prefers larger set)") {
    val g = new DynGraph()
    // two disjoint triangles, all weights 1 — both have density 1
    Seq((0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (5, 3)).foreach { case (a, b) => g.addEdge(a, b, 1.0) }
    val c = StaticPeeling.detect(g)
    assert(c.memberSet == Set(0, 1, 2, 3, 4, 5))
  }

  test("vertex priors pull the community (hybrid-weighted metric)") {
    val g = new DynGraph()
    g.addEdge(0, 1, 1.0)
    g.addEdge(2, 3, 1.0)
    g.setVertexWeight(2, 5.0) // side information: vertex 2 is suspicious
    val c = StaticPeeling.detect(g)
    assert(c.memberSet.contains(2))
    assert(!c.memberSet.contains(0) && !c.memberSet.contains(1))
  }

  test("peeling weights telescope: Σ Δ = f(V)") {
    val g = graphOf(randomTxs(30, 200, seed = 3))
    val o = StaticPeeling.peel(g)
    val sum = o.toWeightSeq.sum
    assert(math.abs(sum - g.totalF) < 1e-6)
  }

  test("peel is deterministic across runs") {
    val txs = randomTxs(25, 120, seed = 11)
    val a = StaticPeeling.peel(graphOf(txs)).toVertexSeq
    val b = StaticPeeling.peel(graphOf(txs)).toVertexSeq
    assert(a == b)
  }

  test("peel does not mutate the graph") {
    val g = graphOf(randomTxs(20, 80, seed = 5))
    val f0 = g.totalF; val e0 = g.numEdges
    StaticPeeling.peel(g)
    assert(g.totalF == f0 && g.numEdges == e0)
  }

  test("Lemma 2.1: g(S^P) >= 1/2 g(S*) on random small graphs (brute force)") {
    (1L to 30L).foreach { seed =>
      val rng = new scala.util.Random(seed)
      val g = new DynGraph()
      val n = 5 + rng.nextInt(6) // 5..10 vertices
      g.ensureVertex(n - 1)
      (0 until n + rng.nextInt(12)).foreach { _ =>
        val a = rng.nextInt(n); var b = rng.nextInt(n)
        while (b == a) b = rng.nextInt(n)
        g.addEdge(a, b, 0.5 + rng.nextInt(40) / 10.0)
      }
      if (rng.nextBoolean()) g.setVertexWeight(rng.nextInt(n), rng.nextInt(5).toDouble)
      val (gStar, _) = StaticPeeling.bruteForceOptimum(g)
      val gPeel = StaticPeeling.detect(g).density
      assert(gPeel >= gStar / 2 - 1e-9, s"seed $seed: peel $gPeel vs optimum $gStar")
      assert(gPeel <= gStar + 1e-9, s"seed $seed: peel beats the optimum?!")
    }
  }

  test("detectThreshold(1.0) equals detect()") {
    val o = StaticPeeling.peel(graphOf(randomTxs(30, 150, 2)))
    val a = o.detect(); val b = o.detectThreshold(1.0)
    assert(math.abs(a.density - b.density) < 1e-9)
    assert(a.memberSet == b.memberSet)
  }

  test("detectThreshold returns near-equally dense instances together (Fig. 14)") {
    val g = new DynGraph()
    // block A density 5, block B density 4.5, long light fringe chain —
    // beta 0.6 takes both blocks (and at most a couple of light stragglers),
    // beta 1.0 only A
    Seq((0, 1, 5.0), (1, 2, 5.0), (2, 0, 5.0)).foreach { case (a, b, w) => g.addEdge(a, b, w) }
    Seq((10, 11, 4.5), (11, 12, 4.5), (12, 10, 4.5)).foreach { case (a, b, w) => g.addEdge(a, b, w) }
    (0 until 10).foreach(i => g.addEdge(20 + i, 21 + i, 0.2))
    val o = StaticPeeling.peel(g)
    val strict = o.detect()
    assert(strict.memberSet == Set(0, 1, 2))
    val loose = o.detectThreshold(0.6)
    assert(Set(0, 1, 2, 10, 11, 12).subsetOf(loose.memberSet), loose.memberSet)
    assert(!loose.memberSet.contains(20) && !loose.memberSet.contains(21))
  }

  test("detectThreshold rejects invalid beta") {
    val o = StaticPeeling.peel(graphOf(paperEdges))
    intercept[IllegalArgumentException](o.detectThreshold(0.0))
    intercept[IllegalArgumentException](o.detectThreshold(1.5))
  }

  test("the returned order is a valid greedy sequence (random graphs)") {
    (1L to 10L).foreach { seed =>
      val spade = loadedSpade(Suspiciousness.DW, randomTxs(18, 60, seed))
      assertValidGreedy(spade, s"seed $seed")
    }
  }
}
