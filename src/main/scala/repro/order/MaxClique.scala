package repro.order

import repro.graph.LocalGraph

/** Exact maximum-clique size (omega), for the dataset-statistics table.
  *
  * Tomita-style branch-and-bound with a greedy-coloring upper bound, run per
  * degeneracy-ordered top vertex so every subproblem has at most delta + 1
  * vertices. Adjacency inside a subproblem is a bitset matrix, so candidate
  * intersections are word-parallel — the JVM analog of the paper's note that
  * SIMD would help but is orthogonal.
  */
object MaxClique {

  def omega(g: LocalGraph): Int = {
    if (g.m == 0) return math.min(g.n, 1)
    val core = CoreDecomposition.run(g)
    var best = 1

    val n = g.n
    var i = 0
    while (i < n) {
      val v = core.order(i)
      // A clique through v (as its minimum-rank vertex) has at most
      // coreness(v) + 1 vertices; skip dominated subproblems.
      if (core.coreness(v) + 1 > best) {
        val cands = laterNeighbors(g, core.rank, v)
        if (cands.length + 1 > best) {
          val s = cands.length
          val words = (s + 63) >>> 6
          val rows = Array.ofDim[Long](s, words)
          var a = 0
          while (a < s) {
            var b = a + 1
            while (b < s) {
              if (g.hasEdge(cands(a), cands(b))) {
                rows(a)(b >>> 6) |= 1L << (b & 63)
                rows(b)(a >>> 6) |= 1L << (a & 63)
              }
              b += 1
            }
            a += 1
          }
          val solver = new Solver(rows, words)
          val full = new Array[Long](words)
          var w = 0
          while (w < s) { full(w >>> 6) |= 1L << (w & 63); w += 1 }
          solver.best = best - 1 // clique sizes inside the subproblem exclude v
          solver.expand(0, full)
          best = math.max(best, solver.best + 1)
        }
      }
      i += 1
    }
    best
  }

  private def laterNeighbors(g: LocalGraph, rank: Array[Int], v: Int): Array[Int] = {
    val buf = new scala.collection.mutable.ArrayBuffer[Int]
    var p = g.offsets(v)
    val end = g.offsets(v + 1)
    while (p < end) {
      val w = g.adj(p)
      if (rank(w) > rank(v)) buf += w
      p += 1
    }
    buf.toArray
  }

  /** Branch-and-bound over one subproblem's bitset adjacency. */
  private final class Solver(rows: Array[Array[Long]], words: Int) {
    var best = 0
    private val s = rows.length

    private def popAnd(a: Array[Long], b: Array[Long]): Int = {
      var c = 0; var w = 0
      while (w < words) { c += java.lang.Long.bitCount(a(w) & b(w)); w += 1 }
      c
    }

    /** Greedy-colors the candidate set and returns vertices ordered so that
      * `bounds(i)` = color of `verts(i)`, colors non-decreasing.
      */
    private def colorSort(cand: Array[Long]): (Array[Int], Array[Int]) = {
      val verts = new scala.collection.mutable.ArrayBuffer[Int]
      val bounds = new scala.collection.mutable.ArrayBuffer[Int]
      val left = cand.clone()
      var color = 0
      var remaining = 0
      var w = 0
      while (w < words) { remaining += java.lang.Long.bitCount(left(w)); w += 1 }
      while (remaining > 0) {
        color += 1
        val avail = left.clone()
        var aw = 0
        while (aw < words) {
          var bits = avail(aw)
          while (bits != 0) {
            val b = java.lang.Long.numberOfTrailingZeros(bits)
            val v = (aw << 6) + b
            bits &= bits - 1
            verts += v; bounds += color
            left(aw) &= ~(1L << b)
            remaining -= 1
            // Remove v's neighbors from this color class.
            var k = 0
            while (k < words) { avail(k) &= ~rows(v)(k); k += 1 }
            bits &= avail(aw) // neighbors of v may have been cleared
          }
          aw += 1
        }
      }
      (verts.toArray, bounds.toArray)
    }

    def expand(depth: Int, cand: Array[Long]): Unit = {
      var empty = true
      var w = 0
      while (w < words && empty) { if (cand(w) != 0) empty = false; w += 1 }
      if (empty) { if (depth > best) best = depth; return }
      val (verts, bounds) = colorSort(cand)
      var i = verts.length - 1
      val live = cand.clone()
      while (i >= 0) {
        if (depth + bounds(i) <= best) return
        val v = verts(i)
        live(v >>> 6) &= ~(1L << (v & 63))
        val next = new Array[Long](words)
        var k = 0
        var any = false
        while (k < words) { next(k) = live(k) & rows(v)(k); if (next(k) != 0) any = true; k += 1 }
        if (!any) { if (depth + 1 > best) best = depth + 1 }
        else expand(depth + 1, next)
        i -= 1
      }
    }
  }
}
