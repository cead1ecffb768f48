package jobs

/** Entry point for T5 / Fig 14 (cost model validation). */
object T5CostValidation {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("t5-cost-validation")
    try JobUtil.emit(repro.exp.T5CostValidation.table(repro.exp.T5CostValidation.run(spark)))
    finally spark.stop()
  }
}
