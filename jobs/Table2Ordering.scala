package repro.jobs

import repro.graph.SynthGraphs
import repro.order.{CoreDecomposition, TrussDecomposition}
import repro.util.Timer

/** Reproduces Table 2: time to generate the truss-based edge ordering
  * (EBBkC's preprocessing) versus the degeneracy ordering (VBBkC's), on the
  * four default datasets. The paper's shape: truss ordering costs slightly
  * more, but the overall EBBkC runtime still wins (Figure 6 / ablation).
  *
  * Run with: spark-submit --class repro.jobs.Table2Ordering <jar>
  */
object Table2Ordering {

  def render(): String = {
    val sb = new StringBuilder
    sb ++= f"${"Graph"}%-6s ${"Truss (s)"}%12s ${"Degen. (s)"}%12s\n"
    for (name <- SynthGraphs.defaults) {
      val g = SynthGraphs(name)
      val tTruss = Timer.median(reps = 3, warmup = 1)(TrussDecomposition.run(g)).seconds
      val tDegen = Timer.median(reps = 3, warmup = 1)(CoreDecomposition.run(g)).seconds
      sb ++= f"$name%-6s $tTruss%12.4f $tDegen%12.4f\n"
    }
    sb.result()
  }

  def main(args: Array[String]): Unit = {
    println("== Table 2: ordering-generation time (truss vs degeneracy) ==")
    println("Paper (s): WK 0.2/0.1  PO 10.7/7.3  ST 1.1/0.6  OR 60.4/53.3")
    println(render())
  }
}
