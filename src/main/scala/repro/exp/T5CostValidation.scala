package repro.exp

import org.apache.spark.sql.SparkSession
import scala.util.Random
import repro.core._
import repro.data.TreeData
import repro.engine.Engine

/** T5 (paper Fig 14, §5.5): does the cost model track real execution?
  * For several query shapes we draw random valid join orders, predict the
  * weighted cost from the *measured* per-edge statistics, execute, and
  * report the correlation between (a) predicted cost and measured weighted
  * probes, and (b) predicted cost and wall-clock time.
  */
object T5CostValidation {

  final case class Point(query: String, approach: String, predicted: Double,
                         measured: Double, wallMs: Long)

  val queries: Seq[(String, Seq[EdgeStats] => JoinTree, Int)] = Seq(
    ("star5",   (st: Seq[EdgeStats]) => JoinTree.star(5, st), 4),
    ("path5",   (st: Seq[EdgeStats]) => JoinTree.centeredPath(5, st), 4),
    ("snow2-2", (st: Seq[EdgeStats]) => JoinTree.snowflake(2, 2, st), 6),
  )

  def run(spark: SparkSession, driverN: Long = 10000, nOrders: Int = 20,
          approaches: Seq[Approach] = Seq(Approach.Com, Approach.Std),
          seed: Long = 17L): Seq[Point] = {
    val w   = Weights()
    val pts = scala.collection.mutable.ListBuffer.empty[Point]
    for (((name, mk, nEdges), qi) <- queries.zipWithIndex) {
      val rng = new Random(seed + qi)
      val st = Seq.fill(nEdges)(EdgeStats(
        0.1 + rng.nextDouble() * 0.5, 1.0 + rng.nextDouble() * 4.0))
      val t0   = mk(st)
      val tree = new JoinTree(t0.parent, t0.stats, t0.probeCost, driverN.toDouble)
      val q    = TreeData.generate(spark, tree, seed + 100 + qi)
      q.rels.foreach(r => { r.persist(); r.count() })
      try {
        // Predict with *measured* statistics so generator noise does not
        // blur the model-vs-execution comparison.
        val measured = (1 until tree.n).map(i => TreeData.measuredStats(q, i))
        val mTree = new JoinTree(
          tree.parent,
          (EdgeStats(1, 1) +: measured.map { case (m, fo) => EdgeStats(m, math.max(fo, 1.0)) }).toArray,
          tree.probeCost, q.rels(0).count().toDouble)
        val orders = Seq.fill(nOrders)(Optimizer.randomOrder(tree, rng)).distinct
        for (order <- orders; a <- approaches) {
          val pred = CostModel.cost(mTree, order, a, flatOutput = true).total(w)
          val res  = Engine.run(q, order, a, counting = true, flatOutput = true)
          pts += Point(name, a.name, pred, res.log.weighted(w), res.log.wallMs)
        }
      } finally q.rels.foreach(_.unpersist(blocking = false))
    }
    pts.toList
  }

  def table(pts: Seq[Point]): Seq[String] = {
    val rows = for {
      q <- pts.map(_.query).distinct
      a <- pts.map(_.approach).distinct
      sel = pts.filter(p => p.query == q && p.approach == a) if sel.length >= 2
    } yield {
      val relErr = sel.map(p => math.abs(p.predicted - p.measured) / math.max(p.measured, 1.0))
      Seq(q, a, sel.length.toString,
        Tables.fmt(Tables.pearson(sel.map(_.predicted), sel.map(_.measured))),
        Tables.fmt(Tables.pearson(sel.map(_.predicted), sel.map(_.wallMs.toDouble))),
        Tables.fmt(Tables.percentile(relErr, 50)),
        Tables.fmt(Tables.percentile(relErr, 90)))
    }
    Tables.render(
      "T5 / Fig 14 - cost model vs execution (per query shape & approach)",
      Seq("query", "approach", "#orders", "corr(pred, probes)",
          "corr(pred, wall)", "relerr p50", "relerr p90"),
      rows)
  }
}
