package repro.graph

import java.util.Arrays

/** Immutable undirected simple graph in CSR (compressed sparse row) form.
  *
  * Vertices are dense ints in `0 until n`. Neighbor lists are sorted, so an
  * adjacency test is `O(log deg)` and set intersections are linear merges.
  * Every undirected edge has a single id in `0 until m` (assigned in
  * lexicographic `(u, v)` order with `u < v`); `adjEdgeIds` is parallel to
  * `adj` so kernels can look up the id — and hence the truss rank — of the
  * edge being traversed in `O(1)` while merging neighbor lists.
  *
  * The class is `Serializable` so a prepared graph can be broadcast to Spark
  * executors for subgraph-centric k-clique listing.
  */
final class LocalGraph private (
    val n: Int,
    val offsets: Array[Int],
    val adj: Array[Int],
    val adjEdgeIds: Array[Int],
    val edgeU: Array[Int],
    val edgeV: Array[Int]
) extends Serializable {

  /** Number of undirected edges. */
  def m: Int = edgeU.length

  @inline def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Position of `v` in `u`'s sorted neighbor slice of `adj`, or negative if absent. */
  @inline def adjPos(u: Int, v: Int): Int =
    Arrays.binarySearch(adj, offsets(u), offsets(u + 1), v)

  @inline def hasEdge(u: Int, v: Int): Boolean = u != v && adjPos(u, v) >= 0

  /** Undirected edge id of `(u, v)`, or -1 if the edge is absent. */
  @inline def edgeIdOf(u: Int, v: Int): Int = {
    val p = adjPos(u, v)
    if (p >= 0) adjEdgeIds(p) else -1
  }

  /** Fresh copy of `v`'s sorted neighbor list. */
  def neighborsOf(v: Int): Array[Int] = Arrays.copyOfRange(adj, offsets(v), offsets(v + 1))

  lazy val maxDegree: Int = {
    var best = 0; var v = 0
    while (v < n) { val d = degree(v); if (d > best) best = d; v += 1 }
    best
  }

  /** Iterator over canonical `(u, v)` pairs with `u < v`, in edge-id order. */
  def edges: Iterator[(Int, Int)] = (0 until m).iterator.map(e => (edgeU(e), edgeV(e)))

  /** Rough in-memory footprint of the CSR arrays, for the space-cost table. */
  def approxBytes: Long =
    4L * (offsets.length + adj.length + adjEdgeIds.length + edgeU.length + edgeV.length)

  /** The graph with vertex `i` renamed to `perm(i)`; `perm` must be a bijection. */
  def relabel(perm: Array[Int]): LocalGraph = {
    require(perm.length == n, "perm must cover all vertices")
    LocalGraph.fromEdges(n, (0 until m).iterator.map(e => (perm(edgeU(e)), perm(edgeV(e)))))
  }
}

object LocalGraph {

  /** Builds a graph from a possibly-dirty edge list: self-loops are dropped,
    * duplicates and reversed copies are merged. `n` fixes the vertex-id space.
    */
  def fromEdges(n: Int, pairs: IterableOnce[(Int, Int)]): LocalGraph = {
    val packed = pairs.iterator.collect { case (a, b) if a != b =>
      val u = math.min(a, b); val v = math.max(a, b)
      require(u >= 0 && v < n, s"vertex out of range: ($a,$b) with n=$n")
      (u.toLong << 32) | (v.toLong & 0xffffffffL)
    }.toArray
    Arrays.sort(packed)

    var m = 0
    var i = 0
    while (i < packed.length) {
      if (i == 0 || packed(i) != packed(i - 1)) { packed(m) = packed(i); m += 1 }
      i += 1
    }

    val edgeU = new Array[Int](m)
    val edgeV = new Array[Int](m)
    val deg = new Array[Int](n)
    i = 0
    while (i < m) {
      val u = (packed(i) >>> 32).toInt
      val v = (packed(i) & 0xffffffffL).toInt
      edgeU(i) = u; edgeV(i) = v
      deg(u) += 1; deg(v) += 1
      i += 1
    }

    val offsets = new Array[Int](n + 1)
    i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }

    val adj = new Array[Int](2 * m)
    val adjEdgeIds = new Array[Int](2 * m)
    val cursor = Arrays.copyOf(offsets, n)
    // Filling in ascending edge-id (lexicographic) order leaves every
    // neighbor list sorted: for a fixed u the v's ascend, and for a fixed v
    // the u's ascend because edges are sorted by u first.
    var e = 0
    while (e < m) {
      val u = edgeU(e); val v = edgeV(e)
      adj(cursor(u)) = v; adjEdgeIds(cursor(u)) = e; cursor(u) += 1
      adj(cursor(v)) = u; adjEdgeIds(cursor(v)) = e; cursor(v) += 1
      e += 1
    }
    new LocalGraph(n, offsets, adj, adjEdgeIds, edgeU, edgeV)
  }

  /** Builds from parallel endpoint arrays (convenience for generators). */
  def fromEdgeArrays(n: Int, us: Array[Int], vs: Array[Int]): LocalGraph = {
    require(us.length == vs.length, "endpoint arrays must align")
    fromEdges(n, us.indices.iterator.map(i => (us(i), vs(i))))
  }

  /** The empty graph on `n` vertices. */
  def empty(n: Int): LocalGraph = fromEdges(n, Iterator.empty)
}
