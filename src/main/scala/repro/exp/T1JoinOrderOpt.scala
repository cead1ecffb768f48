package repro.exp

import scala.util.Random
import repro.core._

/** T1 (paper Fig 10, §5.1): quality of the three greedy heuristics against
  * the exhaustive optimal algorithm, measured as the ratio of estimated COM
  * execution cost (Eq. (1) probes) to the optimal cost, over random join
  * trees.
  *
  * Paper setup: 100 random trees per match-probability range, up to 20
  * nodes, fanouts uniform in [1, 10], root 2–5 children, others 0–3.
  */
object T1JoinOrderOpt {

  val mRanges: Seq[(Double, Double)] =
    Seq((0.05, 0.2), (0.05, 0.5), (0.1, 0.5), (0.5, 0.9))

  final case class Result(mRange: (Double, Double), heuristic: String, ratios: Seq[Double])

  def comCost(tree: JoinTree, order: Seq[Int]): Double =
    CostModel.com(tree, order, flatOutput = false).htProbes

  def run(trees: Int = 100, maxNodes: Int = 18, seed: Long = 1L): Seq[Result] = {
    mRanges.flatMap { mr =>
      val rng = new Random(seed + (mr._1 * 1000).toLong)
      val ratios = scala.collection.mutable.Map[String, List[Double]]()
        .withDefaultValue(Nil)
      for (_ <- 0 until trees) {
        val n    = 8 + rng.nextInt(maxNodes - 7)
        val tree = JoinTree.random(n, mr, (1.0, 10.0), rng)
        val (_, opt) = Optimizer.exhaustiveCom(tree)
        for (h <- Optimizer.Heuristic.all) {
          val c = comCost(tree, Optimizer.greedy(tree, h))
          ratios(h.name) = (c / math.max(opt, 1e-300)) :: ratios(h.name)
        }
      }
      Optimizer.Heuristic.all.map(h => Result(mr, h.name, ratios(h.name).reverse))
    }
  }

  def table(results: Seq[Result]): Seq[String] = {
    val rows = results.map { r =>
      Seq(
        s"[${r.mRange._1},${r.mRange._2}]", r.heuristic,
        Tables.fmt(r.ratios.min), Tables.fmt(Tables.percentile(r.ratios, 25)),
        Tables.fmt(Tables.percentile(r.ratios, 50)), Tables.fmt(Tables.percentile(r.ratios, 75)),
        Tables.fmt(Tables.percentile(r.ratios, 95)), Tables.fmt(r.ratios.max),
      )
    }
    Tables.render(
      "T1 / Fig 10 - heuristic cost / exhaustive-optimal cost (COM model)",
      Seq("m-range", "heuristic", "min", "p25", "median", "p75", "p95", "max"),
      rows,
    )
  }
}
