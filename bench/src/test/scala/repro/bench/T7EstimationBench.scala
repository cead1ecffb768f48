package repro.bench

import repro.exp.{T7Estimation, Tables}

/** T7 / paper Fig 4: Q-error of m/fo estimation. Paper shape: even small
  * correlated samples estimate both quantities well (fanouts especially),
  * while the naive estimator fails badly for low-match-probability joins.
  */
class T7EstimationBench extends BenchSpec {

  test("T7: estimator quality, naive vs correlated sampling") {
    val obs = T7Estimation.run(spark)
    emit(T7Estimation.table(obs))

    // Naive's failure mode on low-m queries lives in the tail (the paper's
    // DBLP run had the same shape: one huge naive outlier, stddev 9.44);
    // sampling keeps the tail bounded.
    val lowM = obs.filter(_.trueM < 0.1)
    if (lowM.nonEmpty) {
      val naive  = lowM.filter(_.estimator == "naive").map(_.qErrM)
      val sample = lowM.filter(_.estimator == "sample-5000").map(_.qErrM)
      if (naive.nonEmpty && sample.nonEmpty)
        assert(Tables.percentile(sample, 90) <= Tables.percentile(naive, 90),
          s"sampling tail ${Tables.percentile(sample, 90)} should beat " +
            s"naive tail ${Tables.percentile(naive, 90)} on low-m queries")
    }
    // Fanout estimation with the largest sample is accurate where matches
    // are plentiful (high-m group; the low-m zipf-hub group is noisy by
    // construction, as the paper also observes).
    val foErr = obs.filter(o => o.estimator == "sample-5000" && o.trueM >= 0.1)
      .map(_.qErrFo)
    assert(Tables.percentile(foErr, 50) <= 1.3,
      s"fanout p50 q-error ${Tables.percentile(foErr, 50)}")
  }
}
