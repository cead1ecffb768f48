package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.GraphData
import repro.engine.Engine

/** T3 (paper Fig 12, §5.3): the CE-benchmark experiment, over the synthetic
  * zipf-graph substitutes (DESIGN.md documents the substitution). Queries
  * are self-join patterns over each dataset's edge table; the survival
  * heuristic on naive-estimated statistics picks the order; all six
  * approaches run with exact probe accounting; results are reported
  * relative to COM.
  */
object T3Ce {

  final case class RunRow(dataset: String, query: String, approach: String,
                          status: String, wallMs: Long, weighted: Double)

  /** Exact flat-output cardinality of an alias query, computed on the
    * collected edge list (vertex domains are small) — used to skip queries
    * whose result would not fit, as the paper filtered by result size.
    */
  def exactOut(edges: Array[(Long, Long)], parents: Seq[Int]): Double = {
    val n   = parents.length
    val adj = edges.groupBy(_._1).map { case (s, es) => s -> es.map(_._2) }
    val children = Array.fill(n)(List.empty[Int])
    for (i <- 1 until n) children(parents(i)) = i :: children(parents(i))
    val memo = Array.fill(n)(scala.collection.mutable.Map.empty[Long, Double])
    def cnt(i: Int, v: Long): Double = memo(i).getOrElseUpdate(v, {
      adj.getOrElse(v, Array.empty[Long]).foldLeft(0.0) { (acc, dst) =>
        acc + children(i).map(c => cnt(c, dst)).product
      }
    })
    edges.foldLeft(0.0) { case (acc, (_, dst)) =>
      acc + children(0).map(c => cnt(c, dst)).product
    }
  }

  def run(spark: SparkSession, scale: Double = 0.25, outCap: Double = 2e6,
          probeCap: Double = 3e7, seed: Long = 7L,
          shapes: Seq[(String, Seq[Int])] = GraphData.shapes,
          counting: Boolean = true): Seq[RunRow] = {
    val w    = Weights()
    val rows = scala.collection.mutable.ListBuffer.empty[RunRow]
    for (cfg0 <- GraphData.datasets) {
      val cfg = cfg0.copy(
        vertices = math.max(100L, (cfg0.vertices * scale).toLong),
        edges = math.max(1000L, (cfg0.edges * scale).toLong))
      val e = GraphData.edges(spark, cfg, seed).persist()
      e.count()
      val collected = e.select("src", "dst").collect()
        .map(r => (r.getLong(0), r.getLong(1)))
      try {
        for ((qname, parents) <- shapes) {
          val out = exactOut(collected, parents)
          if (out <= outCap) {
            val q     = GraphData.aliasQuery(spark, e, parents)
            val order = Optimizer.greedy(q.tree, Optimizer.Heuristic.SurvivalProb)
            for (a <- Approach.all) {
              val est = CostModel.cost(q.tree, order, a, flatOutput = true)
              if (est.total(w) > probeCap)
                rows += RunRow(cfg.name, qname, a.name, "TIMEOUT", -1L, -1.0)
              else {
                val res = Engine.run(q, order, a, counting = counting, flatOutput = true)
                rows += RunRow(cfg.name, qname, a.name, "ok",
                  res.log.wallMs, res.log.weighted(w))
              }
            }
          } else rows += RunRow(cfg.name, qname, "(all)", s"SKIP out=${out.toLong}", -1L, -1.0)
        }
      } finally { e.unpersist(blocking = false); () }
    }
    rows.toList
  }

  def table(rows: Seq[RunRow]): Seq[String] = {
    val base = rows.collect {
      case r if r.approach == "COM" && r.status == "ok" => (r.dataset, r.query) -> r
    }.toMap
    val out = rows.map { r =>
      val b = base.get((r.dataset, r.query))
      val (rw, rp) = b match {
        case Some(c) if r.status == "ok" && c.wallMs > 0 && c.weighted > 0 =>
          (r.wallMs.toDouble / c.wallMs, r.weighted / c.weighted)
        case _ => (-1.0, -1.0)
      }
      Seq(r.dataset, r.query, r.approach, r.status,
        if (r.status == "ok") r.wallMs.toString else "-",
        if (r.status == "ok") Tables.fmt(r.weighted) else "-",
        if (rw > 0) Tables.fmt(rw) else "-",
        if (rp > 0) Tables.fmt(rp) else "-")
    }
    Tables.render(
      "T3 / Fig 12 - CE-benchmark substitute, six approaches (ratios vs COM)",
      Seq("dataset", "query", "approach", "status", "wall ms",
          "weighted probes", "wall/COM", "probes/COM"),
      out)
  }
}
