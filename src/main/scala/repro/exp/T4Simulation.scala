package repro.exp

import repro.core._

/** T4 (paper Fig 13, §5.4): analytic comparison of the five approaches
  * (STD omitted, as in the paper, because its cost distorts the scale) on
  * idealized workloads where every edge has the same match probability and
  * fanout. Costs are weighted probe counts per §5.4: bitvector/semi-join
  * probe = 1/2 hash probe, tuple generation = 1/14 hash probe; flat output.
  */
object T4Simulation {

  val shapes: Seq[(String, (Double, Double) => JoinTree)] = Seq(
    "star7"   -> ((m, fo) => JoinTree.star(7, Seq.fill(6)(EdgeStats(m, fo)))),
    "path11"  -> ((m, fo) => JoinTree.centeredPath(11, Seq.fill(10)(EdgeStats(m, fo)))),
    "snow3-2" -> ((m, fo) => JoinTree.snowflake(3, 2, Seq.fill(9)(EdgeStats(m, fo)))),
    "snow5-1" -> ((m, fo) => JoinTree.snowflake(5, 1, Seq.fill(10)(EdgeStats(m, fo)))),
  )

  val approaches: Seq[Approach] =
    Seq(Approach.BvpStd, Approach.SjStd, Approach.Com, Approach.BvpCom, Approach.SjCom)

  final case class Cell(shape: String, fo: Double, m: Double, costs: Map[String, Double])

  /** Per-approach order choice mirrors §5: COM variants via Algorithm 1,
    * STD variants via rank ordering, SJ phase-2 via its closed-form optimum.
    */
  def orderFor(tree: JoinTree, a: Approach): Seq[Int] = a match {
    case Approach.Com    => Optimizer.exhaustiveCom(tree)._1
    case Approach.BvpCom => Optimizer.exhaustiveBvpCom(tree)._1
    case Approach.SjStd  => SemiJoinModel.phase2OrderStd(tree)
    case Approach.SjCom  => SemiJoinModel.phase2OrderCom(tree)
    case _               => Optimizer.greedy(tree, Optimizer.Heuristic.RankOrdering)
  }

  def run(w: Weights = Weights(), driver: Double = 1.0e5): Seq[Cell] =
    for {
      (shape, mk) <- shapes
      fo          <- Seq(2.0, 5.0)
      m           <- (1 to 9).map(_ / 10.0)
    } yield {
      val tree  = {
        val t0 = mk(m, fo)
        new JoinTree(t0.parent, t0.stats, t0.probeCost, driver)
      }
      val costs = approaches.map { a =>
        a.name -> CostModel.cost(tree, orderFor(tree, a), a).total(w)
      }.toMap
      Cell(shape, fo, m, costs)
    }

  def table(cells: Seq[Cell]): Seq[String] = {
    val header = Seq("shape", "fo", "m") ++ approaches.map(_.name)
    val rows = cells.map { c =>
      Seq(c.shape, Tables.fmt(c.fo), Tables.fmt(c.m)) ++
        approaches.map(a => Tables.fmt(c.costs(a.name)))
    }
    Tables.render(
      "T4 / Fig 13 - analytic weighted cost (per-plan total, driver 1e5, flat output)",
      header, rows)
  }
}
