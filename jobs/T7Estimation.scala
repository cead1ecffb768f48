package jobs

/** Entry point for T7 / Fig 4 (m/fo estimation quality). */
object T7Estimation {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("t7-estimation")
    try JobUtil.emit(repro.exp.T7Estimation.table(repro.exp.T7Estimation.run(spark)))
    finally spark.stop()
  }
}
