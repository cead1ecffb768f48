package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Cross-model invariants that must hold over arbitrary trees — the glue
  * that lets the six estimators be compared on one scale (§3.5, §3.6, §5.4).
  */
class ApproachConsistencySpec extends AnyFunSuite {

  private def randomTree(rng: Random, n: Int = 6): JoinTree =
    JoinTree.random(n, (0.1, 0.8), (1, 6), rng, driverSize = 1000)

  private def survOrder(t: JoinTree): Seq[Int] =
    Optimizer.greedy(t, Optimizer.Heuristic.SurvivalProb)

  test("BVP+COM hash probes converge to COM probes as eps grows to cover m gaps") {
    // With eps large enough that every (m + eps) caps at 1, the bitvectors
    // filter nothing and hash probes equal plain COM.
    val rng = new Random(61)
    for (_ <- 0 until 20) {
      val t = randomTree(rng)
      val o = survOrder(t)
      val bvp = CostModel.bvpCom(t, o, flatOutput = false, eps = 1.0).htProbes
      val com = CostModel.com(t, o, flatOutput = false).htProbes
      assert(math.abs(bvp - com) < 1e-6 * math.max(1.0, com))
    }
  }

  test("BVP+STD hash probes converge to STD probes at saturating eps") {
    val rng = new Random(67)
    for (_ <- 0 until 20) {
      val t = randomTree(rng)
      val o = survOrder(t)
      val bvp = CostModel.bvpStd(t, o, eps = 1.0).htProbes
      val std = CostModel.std(t, o).htProbes
      assert(math.abs(bvp - std) < 1e-6 * math.max(1.0, std))
    }
  }

  test("BVP+COM hash probes are monotone non-decreasing in eps") {
    val rng = new Random(71)
    for (_ <- 0 until 20) {
      val t = randomTree(rng)
      val o = survOrder(t)
      val a = CostModel.bvpCom(t, o, flatOutput = false, eps = 0.0).htProbes
      val b = CostModel.bvpCom(t, o, flatOutput = false, eps = 0.1).htProbes
      val c = CostModel.bvpCom(t, o, flatOutput = false, eps = 0.5).htProbes
      assert(a <= b + 1e-9 && b <= c + 1e-9)
    }
  }

  test("BVP+COM hash probes never exceed COM probes (bitvectors only prune)") {
    val rng = new Random(73)
    for (_ <- 0 until 30) {
      val t = randomTree(rng)
      val o = survOrder(t)
      val bvp = CostModel.bvpCom(t, o, flatOutput = false, eps = 0.01).htProbes
      val com = CostModel.com(t, o, flatOutput = false).htProbes
      assert(bvp <= com + 1e-9)
    }
  }

  test("SJ+COM phase-2 probes never exceed plain COM probes") {
    // Full reduction can only shrink what each probe sees.
    val rng = new Random(79)
    for (_ <- 0 until 30) {
      val t = randomTree(rng)
      val o = survOrder(t)
      val sj  = CostModel.sj(t, o, useCom = true, flatOutput = false).htProbes
      val com = CostModel.com(t, o, flatOutput = false).htProbes
      assert(sj <= com + 1e-6 * math.max(1.0, com))
    }
  }

  test("every approach charges the same flat-output expansion") {
    val rng = new Random(83)
    val t   = randomTree(rng)
    val o   = survOrder(t)
    val out = t.expectedOutput
    for (a <- Seq(Approach.Com, Approach.BvpCom, Approach.SjCom)) {
      val g = CostModel.cost(t, o, a, flatOutput = true).genTuples
      assert(math.abs(g - out) < 1e-6 * math.max(1.0, out), a.name)
    }
  }

  test("phase-1 semi-join probes are bounded by total relation size × children") {
    val rng = new Random(89)
    for (_ <- 0 until 20) {
      val t = randomTree(rng)
      val bound = (0 until t.n).map(i => t.size(i) * t.children(i).length).sum
      assert(SemiJoinModel.phase1Probes(t) <= bound + 1e-6)
    }
  }

  test("driver-level bitvector sweep is charged once per driver child") {
    val t = JoinTree.star(4, Seq(EdgeStats(0.5, 2), EdgeStats(0.5, 2), EdgeStats(0.5, 2)),
      driverSize = 100)
    val c = CostModel.bvpStd(t, Seq(1, 2, 3), eps = 0.0)
    // bv probes: 100 + 50 + 25 = 175
    assert(math.abs(c.bvProbes - 175.0) < 1e-9)
  }

  test("star query: COM cost is fanout-independent (the §3.7 robustness core)") {
    val o = Seq(1, 2, 3)
    val a = JoinTree.star(4, Seq(EdgeStats(0.5, 1), EdgeStats(0.3, 1), EdgeStats(0.7, 1)), 100)
    val b = JoinTree.star(4, Seq(EdgeStats(0.5, 9), EdgeStats(0.3, 4), EdgeStats(0.7, 2)), 100)
    val ca = CostModel.com(a, o, flatOutput = false).htProbes
    val cb = CostModel.com(b, o, flatOutput = false).htProbes
    assert(math.abs(ca - cb) < 1e-9)
  }

  test("STD cost on the same star explodes with fanout (the contrast)") {
    val o = Seq(1, 2, 3)
    val a = JoinTree.star(4, Seq(EdgeStats(0.5, 1), EdgeStats(0.3, 1), EdgeStats(0.7, 1)), 100)
    val b = JoinTree.star(4, Seq(EdgeStats(0.5, 9), EdgeStats(0.3, 4), EdgeStats(0.7, 2)), 100)
    assert(CostModel.std(b, o).htProbes > 2 * CostModel.std(a, o).htProbes)
  }

  test("exhaustive DP with STD step cost agrees with greedy rank ordering on stars") {
    // For star queries (no precedence interactions) rank ordering is the
    // classical optimum; the DP must agree.
    val rng = new Random(97)
    for (_ <- 0 until 10) {
      val t = JoinTree.star(6,
        Seq.fill(5)(EdgeStats(0.1 + rng.nextDouble() * 0.8, 1 + rng.nextDouble() * 5)), 100)
      val (_, dp) = Optimizer.exhaustive(t, Optimizer.stepCostStd(t))
      val g = CostModel.std(t, Optimizer.greedy(t, Optimizer.Heuristic.RankOrdering)).htProbes
      assert(math.abs(dp - g) < 1e-6 * math.max(1.0, g))
    }
  }

  test("weighted totals rank SJ phase-1 against its savings consistently") {
    // Sanity: SJ never reports negative components.
    val rng = new Random(101)
    for (_ <- 0 until 20; useCom <- Seq(true, false)) {
      val t = randomTree(rng)
      val c = CostModel.sj(t, survOrder(t), useCom, flatOutput = true)
      assert(c.htProbes >= 0 && c.semiProbes >= 0 && c.genTuples >= 0)
    }
  }
}
