package jobs

/** Entry point for T8 / Fig 6 (robustness simulation). Pure cost model. */
object T8RobustSim {
  def main(args: Array[String]): Unit =
    JobUtil.emit(repro.exp.T8RobustSim.table(repro.exp.T8RobustSim.run()))
}
