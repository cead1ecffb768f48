package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Estimation
import repro.data.PairData

/** T7 (paper Fig 4, §3.2): Q-error of match-probability and fanout
  * estimation — the naive distinct-value estimator vs correlated sampling
  * at three sample sizes — over randomly configured two-relation joins,
  * split into low-match-probability (m < 0.1) and the rest, as the paper
  * does. (Paper used CE-benchmark DBLP; we use the PairData substitute —
  * see DESIGN.md.)
  */
object T7Estimation {

  final case class Obs(trueM: Double, estimator: String,
                       qErrM: Double, qErrFo: Double)

  def run(spark: SparkSession, nR: Long = 20000, seed: Long = 23L,
          sampleSizes: Seq[Int] = Seq(100, 1000, 5000)): Seq[Obs] = {
    val configs = for {
      overlap <- Seq(0.02, 0.1, 0.3, 0.7, 1.0)
      alpha   <- Seq(None, Some(0.8))
      nS      <- Seq(nR / 2, nR * 2)
    } yield (overlap, alpha, nS)

    configs.zipWithIndex.flatMap { case ((overlap, alpha, nS), i) =>
      val (r, s) = PairData.pair(spark, nR, nS, overlap, alpha, seed + i)
      val rc = r.persist(); val sc = s.persist()
      try {
        val t     = Estimation.trueStats(rc, "a", sc, "a")
        val naive = Estimation.naive(rc, "a", sc, "a")
        val base  = Obs(t.m, "naive",
          Estimation.qError(naive.m, t.m), Estimation.qError(naive.fo, t.fo))
        val samples = sampleSizes.map { k =>
          val e = Estimation.sampled(rc, "a", sc, "a", k, seed + 31 * i + k)
          Obs(t.m, s"sample-$k",
            Estimation.qError(e.m, t.m), Estimation.qError(e.fo, t.fo))
        }
        base +: samples
      } finally { rc.unpersist(blocking = false); sc.unpersist(blocking = false); () }
    }
  }

  def table(obs: Seq[Obs]): Seq[String] = {
    val groups = Seq(
      "low m (<0.1)"  -> obs.filter(_.trueM < 0.1),
      "high m (>=0.1)" -> obs.filter(_.trueM >= 0.1),
    )
    val rows = for {
      (g, os)  <- groups if os.nonEmpty
      est      <- os.map(_.estimator).distinct.sorted
      sel = os.filter(_.estimator == est)
    } yield Seq(
      g, est,
      Tables.fmt(Tables.percentile(sel.map(_.qErrM), 50)),
      Tables.fmt(Tables.percentile(sel.map(_.qErrM), 90)),
      Tables.fmt(sel.map(_.qErrM).max),
      Tables.fmt(Tables.percentile(sel.map(_.qErrFo), 50)),
      Tables.fmt(Tables.percentile(sel.map(_.qErrFo), 90)),
      Tables.fmt(sel.map(_.qErrFo).max),
    )
    Tables.render(
      "T7 / Fig 4 - Q-error of m and fo estimation",
      Seq("m group", "estimator", "qerr(m) p50", "p90", "max",
          "qerr(fo) p50", "p90", "max"),
      rows)
  }
}
