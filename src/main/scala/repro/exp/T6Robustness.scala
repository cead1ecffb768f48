package repro.exp

import org.apache.spark.sql.SparkSession
import scala.util.Random
import repro.core._
import repro.data.TreeData
import repro.engine.Engine

/** T6 (paper Fig 15, §5.6): robustness to the join order. For each query we
  * execute several uniformly random valid join orders (driver fixed) under
  * all six approaches and report, per approach, the spread of the weighted
  * probe cost normalized by that approach's worst order — the paper's
  * relative-robustness box plot as a table. COM variants should show small
  * spreads and SJ+COM almost none (Thm 3.5).
  */
object T6Robustness {

  final case class Row(query: String, approach: String, normalized: Seq[Double],
                       wallSpread: Double)

  val queries: Seq[(String, Seq[EdgeStats] => JoinTree, Int)] = Seq(
    ("star6",   (st: Seq[EdgeStats]) => JoinTree.star(6, st), 5),
    ("snow2-2", (st: Seq[EdgeStats]) => JoinTree.snowflake(2, 2, st), 6),
  )

  def run(spark: SparkSession, driverN: Long = 5000, nOrders: Int = 6,
          seed: Long = 29L): Seq[Row] = {
    val w    = Weights()
    val rows = scala.collection.mutable.ListBuffer.empty[Row]
    for (((name, mk, nEdges), qi) <- queries.zipWithIndex) {
      val rng = new Random(seed + qi)
      val st = Seq.fill(nEdges)(EdgeStats(
        0.2 + rng.nextDouble() * 0.4, 1.0 + rng.nextDouble() * 3.0))
      val t0   = mk(st)
      val tree = new JoinTree(t0.parent, t0.stats, t0.probeCost, driverN.toDouble)
      val q    = TreeData.generate(spark, tree, seed + 100 + qi)
      q.rels.foreach(r => { r.persist(); r.count() })
      try {
        val orders = Iterator.continually(Optimizer.randomOrder(tree, rng))
          .distinct.take(nOrders).toList
        for (a <- Approach.all) {
          val res = orders.map(o => Engine.run(q, o, a, counting = true))
          val probes = res.map(_.log.weighted(w))
          val walls  = res.map(_.log.wallMs.toDouble)
          val maxP   = math.max(probes.max, 1e-9)
          rows += Row(name, a.name, probes.map(_ / maxP),
            if (walls.max > 0) walls.min / walls.max else 1.0)
        }
      } finally q.rels.foreach(_.unpersist(blocking = false))
    }
    rows.toList
  }

  def table(rows: Seq[Row]): Seq[String] =
    Tables.render(
      "T6 / Fig 15 - robustness across random join orders " +
        "(weighted probes normalized by each approach's worst order)",
      Seq("query", "approach", "min", "median", "max", "spread(max-min)", "wall min/max"),
      rows.map { r =>
        Seq(r.query, r.approach,
          Tables.fmt(r.normalized.min),
          Tables.fmt(Tables.percentile(r.normalized, 50)),
          Tables.fmt(r.normalized.max),
          Tables.fmt(r.normalized.max - r.normalized.min),
          Tables.fmt(r.wallSpread))
      })
}
