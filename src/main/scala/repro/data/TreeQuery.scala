package repro.data

import org.apache.spark.sql.DataFrame
import repro.core.JoinTree

/** A multi-way join query over a rooted join tree, bound to concrete Spark
  * relations.
  *
  * For every non-root node `i`, relation `i` joins its parent on
  * `parent(parentCol(i)) = child(childCol(i))`. Column names are globally
  * unique across the relations (`k3`, `fk3`, ...), so executors can fold
  * joins without alias bookkeeping.
  *
  * @param tree      join-tree shape + statistics (statistics drive the cost
  *                  model; execution uses only the shape)
  * @param rels      relation DataFrames, indexed by node
  * @param parentCol for i ≥ 1: join column in the parent relation
  * @param childCol  for i ≥ 1: join column in relation i
  * @param keyCol    a row-identifying column of relation i, used to project
  *                  final results for correctness checks
  */
final case class TreeQuery(
    tree: JoinTree,
    rels: IndexedSeq[DataFrame],
    parentCol: IndexedSeq[String],
    childCol: IndexedSeq[String],
    keyCol: IndexedSeq[String],
) {
  require(rels.length == tree.n && parentCol.length == tree.n &&
    childCol.length == tree.n && keyCol.length == tree.n)

  /** All result-projection columns, driver first. */
  def outputCols: Seq[String] = keyCol

  /** The equivalent flat SQL over tables named t0..t{n-1} — fed to the
    * DuckDB oracle.
    */
  def flatSql: String = {
    val from = rels.indices.map(i => s"t$i").mkString(", ")
    val cond = (1 until tree.n)
      .map(i => s"t${tree.parent(i)}.${parentCol(i)} = t$i.${childCol(i)}")
      .mkString(" AND ")
    val proj = rels.indices.map(i => s"t$i.${keyCol(i)} AS ${keyCol(i)}").mkString(", ")
    s"SELECT $proj FROM $from WHERE $cond"
  }

  /** Named (table → DataFrame) pairs for the oracle. */
  def oracleTables: Seq[(String, DataFrame)] =
    rels.indices.map(i => s"t$i" -> rels(i))
}
