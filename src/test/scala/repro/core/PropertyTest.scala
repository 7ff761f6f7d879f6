package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}
import repro.order.{CoreDecomposition, TrussDecomposition}

/** Randomized property tests: structural invariants of the orderings and
  * metamorphic relations of the counting kernels on arbitrary small graphs.
  * (scalatestplus is not in the offline cache, so properties run through
  * scalacheck's own Test runner.)
  */
class PropertyTest extends AnyFunSuite {

  private def check(p: Prop): Unit = {
    val params = org.scalacheck.Test.Parameters.default
      .withMinSuccessfulTests(40)
      .withInitialSeed(org.scalacheck.rng.Seed(20240814L))
    val res = org.scalacheck.Test.check(params, p)
    assert(res.passed, res.status.toString)
  }

  private val genGraph: Gen[LocalGraph] = for {
    n <- Gen.choose(4, 28)
    p <- Gen.choose(10, 60).map(_ / 100.0)
    seed <- Gen.choose(0L, 100000L)
  } yield GraphGen.gnp(n, p, seed)

  test("property: tau < delta on every generated graph with edges (Lemma 4.1)") {
    check(Prop.forAll(genGraph) { g =>
      g.m == 0 || TrussDecomposition.run(g).tau < CoreDecomposition.run(g).degeneracy
    })
  }

  test("property: EBBkC+ET count equals brute force for k in 3..5") {
    check(Prop.forAll(genGraph, Gen.choose(3, 5)) { (g, k) =>
      KClique.count(g, k, Algos.EBBkCET) == BruteForce.count(g, k)
    })
  }

  test("property: all three EBBkC orderings agree") {
    check(Prop.forAll(genGraph, Gen.choose(3, 5)) { (g, k) =>
      val t = KClique.count(g, k, EbbkcAlgo(TrussOrdering))
      val c = KClique.count(g, k, EbbkcAlgo(ColorOrdering))
      val h = KClique.count(g, k, EbbkcAlgo(HybridOrdering))
      t == c && c == h
    })
  }

  test("property: VBBkC variants agree with EBBkC") {
    check(Prop.forAll(genGraph, Gen.choose(3, 5)) { (g, k) =>
      val e = KClique.count(g, k, Algos.EBBkC)
      Seq[AlgoConfig](Algos.Degen, Algos.DDegree, Algos.BitCol, Algos.DDegColPlus)
        .forall(cfg => KClique.count(g, k, cfg) == e)
    })
  }

  test("property: ET threshold does not change counts") {
    check(Prop.forAll(genGraph, Gen.choose(3, 5), Gen.choose(1, 5)) { (g, k, t) =>
      KClique.count(g, k, EbbkcAlgo(HybridOrdering, et = EtFixed(t))) ==
        KClique.count(g, k, Algos.EBBkC)
    })
  }

  test("property: adding an edge never decreases the count") {
    check(Prop.forAll(genGraph, Gen.choose(3, 4)) { (g, k) =>
      val nonEdges = for {
        u <- 0 until g.n; v <- u + 1 until g.n if !g.hasEdge(u, v)
      } yield (u, v)
      nonEdges.isEmpty || {
        val (u, v) = nonEdges(g.m % nonEdges.size)
        val g2 = LocalGraph.fromEdges(g.n, g.edges ++ Iterator((u, v)))
        KClique.count(g2, k, Algos.EBBkCET) >= KClique.count(g, k, Algos.EBBkCET)
      }
    })
  }

  test("property: coreness bounds clique membership (omega <= delta + 1)") {
    check(Prop.forAll(genGraph) { g =>
      repro.order.MaxClique.omega(g) <= CoreDecomposition.run(g).degeneracy + 1
    })
  }

  test("property: binomial identities") {
    check(Prop.forAll(Gen.choose(0, 40), Gen.choose(0, 40)) { (n, k) =>
      val b = Combinatorics.binomial(n, k)
      (k > n && b == 0) || (k <= n && b == Combinatorics.binomial(n, n - k))
    })
    check(Prop.forAll(Gen.choose(1, 40), Gen.choose(1, 40)) { (n, k) =>
      k > n || Combinatorics.binomial(n, k) ==
        Combinatorics.binomial(n - 1, k) + Combinatorics.binomial(n - 1, k - 1)
    })
  }

  test("property: forEachCombination enumerates C(n, k) distinct sets") {
    check(Prop.forAll(Gen.choose(0, 10), Gen.choose(0, 5)) { (n, k) =>
      val items = Array.tabulate(n)(identity)
      val seen = scala.collection.mutable.Set.empty[Seq[Int]]
      var cnt = 0L
      Combinatorics.forEachCombination(items, n, k) { (buf, len) =>
        seen += buf.take(len).toSeq
        cnt += 1
      }
      cnt == Combinatorics.binomial(n, k) && seen.size.toLong == cnt
    })
  }
}
