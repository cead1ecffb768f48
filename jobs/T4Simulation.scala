package jobs

/** Entry point for T4 / Fig 13 (analytic simulation). Pure cost model. */
object T4Simulation {
  def main(args: Array[String]): Unit =
    JobUtil.emit(repro.exp.T4Simulation.table(repro.exp.T4Simulation.run()))
}
