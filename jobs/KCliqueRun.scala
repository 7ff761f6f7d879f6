package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.graph.{GraphDF, SynthGraphs}
import repro.util.Timer

/** General spark-submit entrypoint: count k-cliques of a synthetic stand-in
  * with a chosen algorithm, distributed over the session's cores.
  *
  * Usage: spark-submit --class repro.jobs.KCliqueRun <jar> <graph> <k> [algo]
  *   graph: a stand-in name from Table 1 (NA, FB, WK, ..., WP)
  *   k:     clique size >= 3
  *   algo:  EBBkC+ET (default) | EBBkC | EBBkC-T | EBBkC-C | Degen |
  *          DDegree | DDegCol | SDegree | BitCol
  */
object KCliqueRun {

  def algoByName(name: String): AlgoConfig = name match {
    case "EBBkC+ET" => Algos.EBBkCET
    case "EBBkC"    => Algos.EBBkC
    case "EBBkC-T"  => Algos.EBBkCT_ET
    case "EBBkC-C"  => Algos.EBBkCC_ET
    case "Degen"    => Algos.Degen
    case "DDegree"  => Algos.DDegree
    case "DDegCol"  => Algos.DDegCol
    case "SDegree"  => Algos.SDegree
    case "BitCol"   => Algos.BitCol
    case other      => throw new IllegalArgumentException(s"unknown algorithm: $other")
  }

  def main(args: Array[String]): Unit = {
    require(args.length >= 2, "usage: KCliqueRun <graph> <k> [algo]")
    val graphName = args(0)
    val k = args(1).toInt
    val cfg = algoByName(if (args.length >= 3) args(2) else "EBBkC+ET")

    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"kclique-$graphName-$k")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val g = SynthGraphs(graphName)
      val edges = GraphDF.fromLocal(spark, g)
      val t = Timer.time(KCliqueSpark.count(spark, edges, k, cfg))
      println(s"graph=$graphName k=$k algo=${cfg.name} count=${t.result} time=${Timer.fmt(t.seconds)}")
    } finally spark.stop()
  }
}
