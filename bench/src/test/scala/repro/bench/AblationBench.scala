package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** Figure 6 as a table (ablation): EBBkC+ET vs EBBkC vs the Rule(2)-enhanced
  * SOTA baselines DDegCol+ / BitCol+. Shapes to reproduce:
  *   (1) DDegCol+ and BitCol+ are close to each other,
  *   (2) EBBkC beats both (the edge-oriented framework's contribution),
  *   (3) EBBkC+ET beats EBBkC (the early-termination contribution).
  */
class AblationBench extends AnyFunSuite {

  private val algos: Seq[AlgoConfig] =
    Seq(Algos.EBBkCET, Algos.EBBkC, Algos.DDegColPlus, Algos.BitColPlus)

  private val sweeps = Seq(
    "WK" -> Seq(6, 8, 10, 13, 16, 20),
    "ST" -> Seq(6, 8, 10, 14, 18, 22, 26)
  )

  private lazy val allCells = sweeps.map { case (name, ks) =>
    name -> BenchTables.sweepAndPrint(name, ks, algos)
  }

  test("Figure 6 table: sweeps run and counts agree") {
    assert(allCells.nonEmpty)
  }

  for ((name, _) <- sweeps) {
    test(s"Figure 6 shape on $name: EBBkC beats DDegCol+ (framework contribution)") {
      val cells = allCells.find(_._1 == name).get._2
      val s = BenchTables.sumSpeedup(cells, Algos.EBBkC.name, Algos.DDegColPlus.name)
      info(f"$name: EBBkC vs DDegCol+: ${s}%.2fx")
      assert(s > 1.0)
    }
    test(s"Figure 6 shape on $name: EBBkC+ET at least matches EBBkC (ET contribution)") {
      val cells = allCells.find(_._1 == name).get._2
      val s = BenchTables.sumSpeedup(cells, Algos.EBBkCET.name, Algos.EBBkC.name)
      info(f"$name: EBBkC+ET vs EBBkC: ${s}%.2fx")
      // On blob-dominated small-omega graphs ET fires rarely mid-k, so the
      // gain can be ~neutral there (the paper's big ET wins are near omega —
      // see LargeOmegaBench); require it not to cost more than ~15%.
      assert(s > 0.85, f"ET made things ${1 / s}%.2fx slower")
    }
    test(s"Figure 6 shape on $name: DDegCol+ and BitCol+ are within 4x of each other") {
      val cells = allCells.find(_._1 == name).get._2
      val s = BenchTables.geoSpeedup(cells, Algos.BitColPlus.name, Algos.DDegColPlus.name)
      info(f"$name: BitCol+ vs DDegCol+: ${s}%.2fx")
      assert(s > 0.25 && s < 4.0)
    }
  }
}

/** Figure 7 as a table: effect of the edge ordering — EBBkC-T vs EBBkC-C vs
  * EBBkC-H, all with color pruning (where applicable) and ET, per the paper.
  * Shape: H is the fastest or ties the best of T/C.
  */
class OrderingBench extends AnyFunSuite {

  private val algos: Seq[AlgoConfig] = Seq(Algos.EBBkCT_ET, Algos.EBBkCC_ET, Algos.EBBkCET)

  private val sweeps = Seq(
    "WK" -> Seq(6, 8, 10, 13, 16),
    "PO" -> Seq(6, 8, 10, 13, 16)
  )

  private lazy val allCells = sweeps.map { case (name, ks) =>
    name -> BenchTables.sweepAndPrint(name, ks, algos)
  }

  test("Figure 7 table: sweeps run and counts agree") {
    assert(allCells.nonEmpty)
  }

  for ((name, _) <- sweeps)
    test(s"Figure 7 shape on $name: hybrid ordering is not dominated") {
      val cells = allCells.find(_._1 == name).get._2
      val vsT = BenchTables.geoSpeedup(cells, Algos.EBBkCET.name, Algos.EBBkCT_ET.name)
      val vsC = BenchTables.geoSpeedup(cells, Algos.EBBkCET.name, Algos.EBBkCC_ET.name)
      info(f"$name: H vs T: ${vsT}%.2fx, H vs C: ${vsC}%.2fx")
      assert(vsT > 0.8 && vsC > 0.8, "EBBkC-H clearly dominated — shape violated")
    }
}

/** Figure 8 as a table: effect of the new Rule (2) — EBBkC+ET with and
  * without it. Shape: Rule (2) helps more as k grows and never hurts much.
  */
class Rule2Bench extends AnyFunSuite {

  private val algos: Seq[AlgoConfig] = Seq(Algos.EBBkCET, Algos.EBBkCStcET)

  private lazy val cells = BenchTables.sweepAndPrint("WK", Seq(6, 9, 12, 15, 18), algos)

  test("Figure 8 table: sweep runs and counts agree") {
    assert(cells.nonEmpty)
  }

  test("Figure 8 shape: Rule (2) does not slow EBBkC+ET down") {
    val s = BenchTables.geoSpeedup(cells, Algos.EBBkCET.name, Algos.EBBkCStcET.name)
    info(f"WK: with-Rule2 vs without: ${s}%.2fx")
    assert(s > 0.8)
  }
}

/** Figure 9 as a table: effect of the ET threshold t in {1..5}. Shape:
  * t = 2..5 are comparable and t >= 2 is not worse than t = 1 overall.
  */
class EtThresholdBench extends AnyFunSuite {

  private val algos: Seq[AlgoConfig] =
    (1 to 5).map(t => EbbkcAlgo(HybridOrdering, rule2 = true, et = EtFixed(t)))

  private lazy val cells = BenchTables.sweepAndPrint("WK", Seq(8, 12, 16, 20), algos)

  test("Figure 9 table: sweep runs and counts agree") {
    assert(cells.nonEmpty)
  }

  test("Figure 9 shape: some t >= 2 beats t = 1") {
    val t1 = algos.head.name
    val best = (2 to 5).map { t =>
      BenchTables.geoSpeedup(cells, algos(t - 1).name, t1)
    }.max
    info(f"best t>=2 speedup over t=1: ${best}%.2fx")
    // Paper: t in 2..5 runs comparably, with the winner varying by k; at
    // stand-in scale the margins are a few percent, so accept near-parity.
    assert(best >= 0.9)
  }
}
