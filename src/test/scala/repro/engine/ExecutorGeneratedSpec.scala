package repro.engine

import scala.util.Random
import repro.SparkSpec
import repro.core._
import repro.data.{GraphData, TreeData}

/** Executors on generated datasets: result equality across all six
  * approaches (and the DuckDB oracle), probe-count relations, and
  * agreement between measured probes and the cost model evaluated on
  * measured statistics.
  */
class ExecutorGeneratedSpec extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  private def measuredTree(q: repro.data.TreeQuery): JoinTree = {
    val stats = (1 until q.tree.n).map { i =>
      val (m, fo) = TreeData.measuredStats(q, i)
      EdgeStats(m, math.max(fo, 1.0))
    }
    new JoinTree(q.tree.parent, (EdgeStats(1, 1) +: stats).toArray,
      q.tree.probeCost, q.rels(0).count().toDouble)
  }

  test("all six approaches agree with each other and the oracle (snowflake)") {
    val tree = JoinTree.snowflake(2, 1,
      Seq(EdgeStats(0.5, 2), EdgeStats(0.6, 1.5), EdgeStats(0.4, 2.5), EdgeStats(0.7, 1.0)),
      driverSize = 800)
    val q     = TreeData.generate(spark, tree, seed = 21L)
    val order = Seq(1, 2, 3, 4)
    val expected = StdExecutor.run(q, order).flat.get.collect().map(_.toSeq).toSet
    for (a <- Approach.all) {
      val got = Engine.run(q, order, a).flat.get.collect().map(_.toSeq).toSet
      assert(got == expected, a.name)
    }
    repro.Oracle.assertEquivalent(StdExecutor.run(q, order).flat.get,
      q.flatSql, q.oracleTables: _*)
  }

  test("approaches agree across random orders (star)") {
    val rng  = new Random(31)
    val tree = JoinTree.star(5,
      Seq(EdgeStats(0.4, 2), EdgeStats(0.7, 1.5), EdgeStats(0.3, 3), EdgeStats(0.8, 1)),
      driverSize = 600)
    val q = TreeData.generate(spark, tree, seed = 22L)
    for (_ <- 0 until 2) {
      val order = Optimizer.randomOrder(tree, rng)
      val expected = StdExecutor.run(q, order).log.outRows
      for (a <- Seq(Approach.Com, Approach.BvpStd, Approach.SjCom)) {
        assert(Engine.run(q, order, a).log.outRows == expected, s"$a $order")
      }
    }
  }

  test("COM probes never exceed STD probes on real data") {
    val tree = JoinTree.centeredPath(5,
      Seq(EdgeStats(0.5, 3), EdgeStats(0.6, 2), EdgeStats(0.5, 3), EdgeStats(0.6, 2)),
      driverSize = 500)
    val q     = TreeData.generate(spark, tree, seed = 23L)
    val order = Optimizer.greedy(tree, Optimizer.Heuristic.SurvivalProb)
    val com = ComExecutor.run(q, order).log
    val std = StdExecutor.run(q, order).log
    for (l <- 1 until tree.n)
      assert(com.htProbes(l) <= std.htProbes(l), s"node $l")
  }

  test("measured STD probes match the cost model on measured stats (±10%)") {
    val tree = JoinTree.star(4,
      Seq(EdgeStats(0.5, 2), EdgeStats(0.4, 3), EdgeStats(0.6, 1.5)), driverSize = 3000)
    val q     = TreeData.generate(spark, tree, seed = 24L)
    val mt    = measuredTree(q)
    val order = Seq(1, 2, 3)
    val log   = StdExecutor.run(q, order).log
    val model = CostModel.std(mt, order)
    assert(math.abs(log.totalHt - model.htProbes) / model.htProbes < 0.10,
      s"measured ${log.totalHt} model ${model.htProbes}")
  }

  test("measured COM probes match Eq.(1) on measured stats (±15%)") {
    val tree = JoinTree.runningExample(
      Seq(EdgeStats(0.4, 3), EdgeStats(0.6, 2), EdgeStats(0.3, 2),
          EdgeStats(0.7, 2), EdgeStats(0.5, 1.5)),
      driverSize = 3000)
    val q     = TreeData.generate(spark, tree, seed = 25L)
    val mt    = measuredTree(q)
    val order = Seq(1, 2, 4, 3, 5)
    val log   = ComExecutor.run(q, order).log
    val model = CostModel.com(mt, order, flatOutput = false)
    assert(math.abs(log.totalHt - model.htProbes) / model.htProbes < 0.15,
      s"measured ${log.totalHt} model ${model.htProbes}")
  }

  test("SJ executor's phase-1 semi-join count matches the model (±15%)") {
    val tree = JoinTree.snowflake(2, 1,
      Seq(EdgeStats(0.5, 2), EdgeStats(0.4, 2), EdgeStats(0.6, 1.5), EdgeStats(0.3, 2)),
      driverSize = 3000)
    val q     = TreeData.generate(spark, tree, seed = 26L)
    val mt    = measuredTree(q)
    val log   = SjExecutor.run(q, Seq(1, 2, 3, 4), useCom = true).log
    val model = SemiJoinModel.phase1Probes(mt)
    assert(math.abs(log.semiProbes - model) / model < 0.15,
      s"measured ${log.semiProbes} model $model")
  }

  test("BVP reduces hash probes when joins are selective") {
    val tree = JoinTree.star(4,
      Seq(EdgeStats(0.2, 2), EdgeStats(0.2, 2), EdgeStats(0.2, 2)), driverSize = 2000)
    val q     = TreeData.generate(spark, tree, seed = 27L)
    val order = Seq(1, 2, 3)
    val bvp = StdExecutor.run(q, order, bvp = true).log
    val std = StdExecutor.run(q, order).log
    assert(bvp.totalHt < std.totalHt / 2)
    assert(bvp.outRows == std.outRows)
  }

  test("graph self-join queries: COM equals STD (CE substitute)") {
    val cfg = GraphData.Config("t", 80, 400, 0.9)
    val e   = GraphData.edges(spark, cfg, seed = 5L)
    val q   = GraphData.aliasQuery(spark, e, Seq(-1, 0, 1))
    val std = StdExecutor.run(q, Seq(1, 2))
    val com = ComExecutor.run(q, Seq(1, 2))
    assert(std.log.outRows == com.log.outRows)
    val a = std.flat.get.collect().map(_.toSeq).toSet
    val b = com.flat.get.collect().map(_.toSeq).toSet
    assert(a == b)
  }

  test("graph query result matches the oracle") {
    val cfg = GraphData.Config("t2", 60, 250, 1.0)
    val e   = GraphData.edges(spark, cfg, seed = 6L)
    val q   = GraphData.aliasQuery(spark, e, Seq(-1, 0, 0))
    val r   = StdExecutor.run(q, Seq(1, 2))
    repro.Oracle.assertEquivalent(r.flat.get, q.flatSql, q.oracleTables: _*)
  }

  test("wall time is recorded") {
    val tree = JoinTree.star(3, Seq(EdgeStats(0.5, 2), EdgeStats(0.5, 2)), driverSize = 200)
    val q = TreeData.generate(spark, tree, seed = 28L)
    val r = StdExecutor.run(q, Seq(1, 2))
    assert(r.log.wallMs >= 0)
  }
}
