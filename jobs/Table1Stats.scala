package repro.jobs

import repro.graph.SynthGraphs
import repro.order.{CoreDecomposition, MaxClique, TrussDecomposition}

/** Reproduces Table 1 (dataset statistics): |V|, |E|, max degree, degeneracy
  * delta, truss number tau, and maximum clique size omega for every synthetic
  * stand-in, next to the paper's reported numbers.
  *
  * Run with: spark-submit --class repro.jobs.Table1Stats <jar>
  * (no Spark stage is needed — the statistics are in-core computations — but
  * the entrypoint keeps the one-job-per-table convention).
  */
object Table1Stats {

  def render(): String = {
    val sb = new StringBuilder
    sb ++= f"${"Graph"}%-6s ${"|V|"}%9s ${"|E|"}%10s ${"maxD"}%6s ${"delta"}%5s ${"tau"}%5s ${"omega"}%5s   ${"paper(maxD,delta,tau,omega)"}%s\n"
    for (spec <- SynthGraphs.all) {
      val g = spec.build()
      val core = CoreDecomposition.run(g)
      val truss = TrussDecomposition.run(g)
      val omega = MaxClique.omega(g)
      val p = spec.paper
      sb ++= f"${spec.name}%-6s ${g.n}%9d ${g.m}%10d ${g.maxDegree}%6d ${core.degeneracy}%5d ${truss.tau}%5d $omega%5d   (${p.maxDeg},${p.delta},${p.tau},${p.omega})\n"
    }
    sb.result()
  }

  def main(args: Array[String]): Unit = {
    println("== Table 1: dataset statistics (synthetic stand-ins vs paper) ==")
    println(render())
  }
}
