package repro.core

/** A kernel bound to one prepared graph; processes one top-level subproblem
  * per call. Instances hold scratch arrays and must not be shared across
  * threads — create one per Spark partition via [[Prep.newKernel]].
  */
trait SubproblemKernel {
  def run(subId: Int, sink: CliqueSink): Unit
}

/** Everything a k-clique listing run needs beyond the raw graph: orderings
  * (degeneracy / truss / coloring), the relabeled or annotated graph, and the
  * resolved early-termination threshold. Serializable so the driver can
  * broadcast it and executors can spin up kernels locally.
  */
trait Prep extends Serializable {

  /** Number of independent top-level subproblems (edges for EBBkC and the EP
    * scheme, vertices for NP) — the unit of distribution.
    */
  def numSubproblems: Int

  def newKernel(): SubproblemKernel

  /** Rough footprint of the prep structures, for the space-cost table. */
  def approxBytes: Long
}
