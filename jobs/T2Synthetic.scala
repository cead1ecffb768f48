package jobs

/** Entry point for T2 / Fig 11 (synthetic benchmark, six approaches). */
object T2Synthetic {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("t2-synthetic")
    try JobUtil.emit(repro.exp.T2Synthetic.table(repro.exp.T2Synthetic.run(spark)))
    finally spark.stop()
  }
}
