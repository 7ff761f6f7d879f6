package repro.order

import repro.graph.LocalGraph

/** Result of the degeneracy (k-core) peeling of a graph.
  *
  * @param order    the peel sequence: `order(i)` is the i-th removed vertex
  * @param rank     inverse of `order`: `rank(v)` is v's position in the peel
  * @param coreness per-vertex core number
  * @param degeneracy the graph's degeneracy delta = max coreness
  */
final case class DegeneracyResult(
    order: Array[Int],
    rank: Array[Int],
    coreness: Array[Int],
    degeneracy: Int
) extends Serializable

/** Batagelj–Zavrsnik O(n + m) bucket-queue core decomposition.
  *
  * The peel order is the *degeneracy ordering* used by the VBBkC baselines
  * (Degen, DDegree, DDegCol, ...): orienting each edge from the earlier to
  * the later endpoint bounds every out-degree by delta.
  */
object CoreDecomposition {

  def run(g: LocalGraph): DegeneracyResult = {
    val n = g.n
    val deg = new Array[Int](n)
    var v = 0
    var maxDeg = 0
    while (v < n) { deg(v) = g.degree(v); if (deg(v) > maxDeg) maxDeg = deg(v); v += 1 }

    // Counting-sort vertices by degree into `vert`, with `pos` the inverse
    // permutation and `bin(d)` the start index of degree-d's bucket.
    val bin = new Array[Int](maxDeg + 2)
    v = 0
    while (v < n) { bin(deg(v)) += 1; v += 1 }
    var start = 0
    var d = 0
    while (d <= maxDeg) { val c = bin(d); bin(d) = start; start += c; d += 1 }
    val vert = new Array[Int](n)
    val pos = new Array[Int](n)
    v = 0
    while (v < n) { pos(v) = bin(deg(v)); vert(pos(v)) = v; bin(deg(v)) += 1; v += 1 }
    d = maxDeg
    while (d >= 1) { bin(d) = bin(d - 1); d -= 1 }
    bin(0) = 0

    val order = new Array[Int](n)
    val rank = new Array[Int](n)
    val coreness = new Array[Int](n)
    var level = 0
    var i = 0
    while (i < n) {
      val u = vert(i)
      if (deg(u) > level) level = deg(u)
      coreness(u) = level
      order(i) = u
      rank(u) = i
      // Decrement still-unpeeled neighbors, repositioning them one bucket down.
      var p = g.offsets(u)
      val end = g.offsets(u + 1)
      while (p < end) {
        val w = g.adj(p)
        if (pos(w) > i && deg(w) > deg(u)) {
          val dw = deg(w)
          val pw = pos(w)
          val pFirst = bin(dw)
          val wFirst = vert(pFirst)
          if (w != wFirst) {
            pos(w) = pFirst; vert(pw) = wFirst
            pos(wFirst) = pw; vert(pFirst) = w
          }
          bin(dw) += 1
          deg(w) = dw - 1
        }
        p += 1
      }
      i += 1
    }
    DegeneracyResult(order, rank, coreness, level)
  }
}
