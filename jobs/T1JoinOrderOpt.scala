package jobs

/** Entry point for T1 / Fig 10 (join-order optimization quality). Pure
  * cost-model experiment; needs no Spark session.
  */
object T1JoinOrderOpt {
  def main(args: Array[String]): Unit =
    JobUtil.emit(repro.exp.T1JoinOrderOpt.table(repro.exp.T1JoinOrderOpt.run()))
}
