package jobs

/** Entry point for T6 / Fig 15 (robustness across join orders). */
object T6Robustness {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("t6-robustness")
    try JobUtil.emit(repro.exp.T6Robustness.table(repro.exp.T6Robustness.run(spark)))
    finally spark.stop()
  }
}
