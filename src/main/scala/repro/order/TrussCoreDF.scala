package repro.order

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.TriangleDF

/** Distributed k-core machinery over canonical edge tables.
  *
  * Each peel round is a Catalyst job (degree aggregation + semi-join
  * filter). Every round's result is `localCheckpoint`ed: iterative peeling
  * otherwise nests each round's plan inside the next, and the unbounded
  * lineage eventually overflows the driver while re-analyzing it.
  */
object CoreDF {

  /** Edges of the k-core: iteratively drops vertices with degree < k. */
  def kCore(edges: DataFrame, k: Int): DataFrame = {
    var cur = edges.localCheckpoint()
    var curCount = cur.count()
    var changed = true
    while (changed && curCount > 0) {
      val degs = cur.select(col("src").as("v")).unionAll(cur.select(col("dst").as("v")))
        .groupBy("v").agg(count(lit(1)).as("deg"))
      val keep = degs.where(col("deg") >= k).select(col("v"))
      val next = cur
        .join(keep.withColumnRenamed("v", "src"), Seq("src"), "left_semi")
        .join(keep.withColumnRenamed("v", "dst"), Seq("dst"), "left_semi")
        .select(col("src"), col("dst"))
        .localCheckpoint()
      val nextCount = next.count()
      changed = nextCount != curCount
      cur = next
      curCount = nextCount
    }
    cur
  }

  /** Degeneracy delta: the largest k with a non-empty k-core. Peels
    * incrementally, reusing the (k-1)-core as the next round's input.
    */
  def degeneracy(edges: DataFrame): Int = {
    var k = 0
    var core = edges
    var nonEmpty = true
    while (nonEmpty) {
      val next = kCore(core, k + 1)
      if (next.isEmpty) nonEmpty = false
      else { k += 1; core = next }
    }
    k
  }
}

/** Distributed truss machinery: supports come from the Catalyst triangle
  * join, peeling is the standard batch iteration (drop all edges with
  * support < k - 2, recompute, repeat). Lineage is truncated per round for
  * the same reason as in [[CoreDF]].
  */
object TrussDF {

  /** Edges of the k-truss (every edge in >= k - 2 triangles of the subgraph). */
  def kTruss(edges: DataFrame, k: Int): DataFrame = {
    var cur = edges.localCheckpoint()
    var curCount = cur.count()
    var changed = true
    while (changed && curCount > 0) {
      val next = TriangleDF.edgeSupport(cur)
        .where(col("support") >= k - 2)
        .select(col("src"), col("dst"))
        .localCheckpoint()
      val nextCount = next.count()
      changed = nextCount != curCount
      cur = next
      curCount = nextCount
    }
    cur
  }

  /** The paper's tau = k_max - 2: largest k - 2 with a non-empty k-truss. */
  def tau(edges: DataFrame): Int = {
    var t = 0
    var truss = edges
    var nonEmpty = !edges.isEmpty
    while (nonEmpty) {
      val next = kTruss(truss, t + 3)
      if (next.isEmpty) nonEmpty = false
      else { t += 1; truss = next }
    }
    t
  }
}
