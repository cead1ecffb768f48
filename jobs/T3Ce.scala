package jobs

/** Entry point for T3 / Fig 12 (CE-benchmark substitute). */
object T3Ce {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("t3-ce")
    try JobUtil.emit(repro.exp.T3Ce.table(repro.exp.T3Ce.run(spark)))
    finally spark.stop()
  }
}
