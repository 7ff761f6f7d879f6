package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Pure-Catalyst k-clique listing by iterative join expansion over a
  * degree-oriented DAG — the dataflow baseline every kernel is cross-checked
  * against (and the piece the DuckDB oracle can verify directly via SQL
  * self-joins). Practical for small k only; the branch-and-bound kernels own
  * the general case.
  */
object CliqueDF {

  /** Orients each edge toward the endpoint with the larger (degree, id) key —
    * the classic dataflow trick bounding out-degrees by the h-index.
    */
  def degreeDag(edges: DataFrame): DataFrame = {
    val degs = edges.select(col("src").as("v")).unionAll(edges.select(col("dst").as("v")))
      .groupBy("v").agg(count(lit(1)).as("deg"))
    val e = edges
      .join(degs.withColumnRenamed("v", "src").withColumnRenamed("deg", "sdeg"), Seq("src"))
      .join(degs.withColumnRenamed("v", "dst").withColumnRenamed("deg", "ddeg"), Seq("dst"))
    e.select(
      when(struct(col("sdeg"), col("src")) < struct(col("ddeg"), col("dst")), col("src"))
        .otherwise(col("dst")).as("src"),
      when(struct(col("sdeg"), col("src")) < struct(col("ddeg"), col("dst")), col("dst"))
        .otherwise(col("src")).as("dst")
    )
  }

  /** All k-cliques as rows (v1, ..., vk), each listed exactly once (vertices
    * ascend in DAG rank order, not necessarily by id).
    */
  def listCliques(edges: DataFrame, k: Int): DataFrame = {
    require(k >= 2, "cliques start at k = 2")
    val dag = degreeDag(edges)
    var cliques = dag.select(col("src").as("v1"), col("dst").as("v2"))
    var i = 3
    while (i <= k) {
      val ext = dag.select(col("src").as(s"_es"), col("dst").as(s"v$i"))
      var cand = cliques.join(ext, col(s"v${i - 1}") === col("_es")).drop("_es")
      var j = 1
      while (j <= i - 2) {
        val chk = dag.select(col("src").as("_cs"), col("dst").as("_cd"))
        cand = cand
          .join(chk, col(s"v$j") === col("_cs") && col(s"v$i") === col("_cd"), "left_semi")
        j += 1
      }
      cliques = cand
      i += 1
    }
    cliques
  }

  def countCliques(edges: DataFrame, k: Int): Long = listCliques(edges, k).count()
}
