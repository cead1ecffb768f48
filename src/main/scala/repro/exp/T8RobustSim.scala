package repro.exp

import repro.core.Robustness

/** T8 (paper Fig 6, §3.7): simulation of plan-choice robustness under
  * selectivity-estimation errors for a 10-relation star query. For each
  * (m-range × fo-range × error level) cell we draw 100 instances, pick the
  * best order under perturbed statistics, and measure the % cost penalty
  * versus the true best order — under the classical selectivity cost model
  * and under the paper's match-probability (COM) model.
  */
object T8RobustSim {

  val mRanges: Seq[(Double, Double)] =
    Seq((0.05, 0.2), (0.05, 0.5), (0.1, 0.5), (0.5, 0.9))
  val foRanges: Seq[(Double, Double)] = Seq((1, 2), (1, 10), (10, 100))
  val errLevels: Seq[(String, (Double, Double))] =
    Seq("low(15-20%)" -> (0.15, 0.20), "high(90-95%)" -> (0.90, 0.95))

  final case class Cell(mRange: (Double, Double), foRange: (Double, Double),
                        err: String, stdMeanPct: Double, stdMaxPct: Double,
                        comMeanPct: Double, comMaxPct: Double)

  def run(nJoins: Int = 10, trials: Int = 100, seed: Long = 11L): Seq[Cell] =
    for {
      mr          <- mRanges
      fr          <- foRanges
      (name, er)  <- errLevels
    } yield {
      val ts = Robustness.simulate(nJoins, mr, fr, er, trials,
        seed + (mr._1 * 100 + fr._2 + er._1 * 10).toLong)
      Cell(mr, fr, name,
        stdMeanPct = Tables.mean(ts.map(_.stdPct)), stdMaxPct = ts.map(_.stdPct).max,
        comMeanPct = Tables.mean(ts.map(_.comPct)), comMaxPct = ts.map(_.comPct).max)
    }

  def table(cells: Seq[Cell]): Seq[String] =
    Tables.render(
      "T8 / Fig 6 - % cost penalty of optimizing with erroneous stats (star-10)",
      Seq("m-range", "fo-range", "error", "sel: mean%", "sel: max%", "com: mean%", "com: max%"),
      cells.map(c => Seq(
        s"[${c.mRange._1},${c.mRange._2}]", s"[${c.foRange._1},${c.foRange._2}]", c.err,
        Tables.fmt(c.stdMeanPct), Tables.fmt(c.stdMaxPct),
        Tables.fmt(c.comMeanPct), Tables.fmt(c.comMaxPct))))
}
