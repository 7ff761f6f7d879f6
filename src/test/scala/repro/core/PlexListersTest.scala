package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}

/** Direct tests of the early-termination listers (Section 5) against brute
  * force, in both counting and listing mode.
  */
class PlexListersTest extends AnyFunSuite {

  /** Runs tryEarlyTerminate on the whole graph g as one branch. */
  private def run(g: LocalGraph, l: Int, t: Int, wantCliques: Boolean): Either[Long, Set[Seq[Int]]] = {
    val nv = g.n
    val words = (nv + 63) >>> 6
    val rows = Array.ofDim[Long](nv, words)
    for ((u, v) <- g.edges) {
      rows(u)(v >>> 6) |= 1L << (v & 63)
      rows(v)(u >>> 6) |= 1L << (u & 63)
    }
    val verts = Array.tabulate(nv)(identity)
    val stack = new Array[Int](nv + l)
    if (wantCliques) {
      val sink = new CollectingSink
      val handled = PlexListers.tryEarlyTerminate(stack, 0, verts, nv, rows, l, t, sink)
      assert(handled, s"expected t=$t to handle this graph")
      Right(sink.cliques.map(_.toSeq).toSet)
    } else {
      val sink = new CountingSink
      val handled = PlexListers.tryEarlyTerminate(stack, 0, verts, nv, rows, l, t, sink)
      assert(handled, s"expected t=$t to handle this graph")
      Left(sink.total)
    }
  }

  test("clique path: counts are binomials") {
    val g = GraphGen.complete(12)
    for (l <- 1 to 10) assert(run(g, l, 1, wantCliques = false) == Left(Combinatorics.binomial(12, l)))
  }

  test("clique path: listing matches brute force") {
    val g = GraphGen.complete(8)
    for (l <- 2 to 6) assert(run(g, l, 1, wantCliques = true) == Right(BruteForce.list(g, l)))
  }

  for (pairs <- Seq(1, 2, 4); l <- 2 to 6) {
    test(s"kC2Plex on K_12 minus $pairs pairs, l=$l: count and list match brute force") {
      val g = GraphGen.twoPlexWithPairs(12, pairs)
      val want = BruteForce.list(g, l)
      assert(run(g, l, 2, wantCliques = false) == Left(want.size.toLong))
      assert(run(g, l, 2, wantCliques = true) == Right(want))
    }
  }

  test("kC2Plex count identity: sum_j C(f, l-j) C(p, j) 2^j") {
    val n = 14; val pairs = 5
    val g = GraphGen.twoPlexWithPairs(n, pairs)
    val f = n - 2 * pairs
    for (l <- 1 to n) {
      val expect = (0 to l).map { j =>
        Combinatorics.binomial(f, l - j) * Combinatorics.binomial(pairs, j) * (1L << j)
      }.sum
      if (l <= n) {
        val nvOk = g.n >= l
        if (nvOk) assert(run(g, l, 2, wantCliques = false) == Left(expect), s"l=$l")
      }
    }
  }

  for (t <- 3 to 5; l <- 2 to 6) {
    test(s"kCtPlex on a $t-plex(16), l=$l: count and list match brute force") {
      val g = GraphGen.tPlex(16, t, seed = t * 10 + l)
      val want = BruteForce.list(g, l)
      assert(run(g, l, t, wantCliques = false) == Left(want.size.toLong))
      assert(run(g, l, t, wantCliques = true) == Right(want))
    }
  }

  test("kCtPlex handles graphs with no universal vertices") {
    // 3-plex where every vertex misses some neighbor.
    val g = GraphGen.tPlex(10, 3, seed = 99)
    val minDeg = (0 until g.n).map(g.degree).min
    if (minDeg < g.n - 1) {
      for (l <- 2 to 5)
        assert(run(g, l, 3, wantCliques = false) == Left(BruteForce.count(g, l)))
    }
  }

  test("dispatch refuses graphs sparser than the threshold") {
    val g = GraphGen.cycle(8) // min degree 2 << 8 - t for small t
    val rows = Array.ofDim[Long](8, 1)
    for ((u, v) <- g.edges) { rows(u)(0) |= 1L << v; rows(v)(0) |= 1L << u }
    val sink = new CountingSink
    val handled = PlexListers.tryEarlyTerminate(
      new Array[Int](8), 0, Array.tabulate(8)(identity), 8, rows, 3, 3, sink)
    assert(!handled)
    assert(sink.total == 0)
  }

  test("partial clique prefix is preserved in emissions") {
    val g = GraphGen.complete(5)
    val rows = Array.ofDim[Long](5, 1)
    for ((u, v) <- g.edges) { rows(u)(0) |= 1L << v; rows(v)(0) |= 1L << u }
    val stack = new Array[Int](8)
    stack(0) = 100; stack(1) = 200 // pretend S = {100, 200}
    val sink = new CollectingSink
    PlexListers.tryEarlyTerminate(stack, 2, Array.tabulate(5)(identity), 5, rows, 2, 2, sink)
    assert(sink.cliques.nonEmpty)
    assert(sink.cliques.forall(c => c.contains(100) && c.contains(200) && c.length == 4))
  }

  test("l = 1 on a 2-plex lists every vertex") {
    val g = GraphGen.twoPlexWithPairs(8, 2)
    assert(run(g, 1, 2, wantCliques = false) == Left(8L))
  }

  test("l equal to the plex's max clique size") {
    val g = GraphGen.twoPlexWithPairs(10, 3) // omega = 7 (all F + one per pair)
    assert(run(g, 7, 2, wantCliques = false) == Left(BruteForce.count(g, 7)))
    assert(run(g, 8, 2, wantCliques = false) == Left(0L))
  }
}
