package repro.core.tvr

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Delta-encoded relations: every incremental DataFrame carries a signed
  * multiplicity column [[Delta.MULT]] (the "#" column of the paper's Fig. 1).
  *
  * A snapshot is a delta-encoded relation whose collapsed multiplicities are
  * all positive; a delta may contain negative rows (retractions). The merge
  * operator `+#` of the TIP model is [[Delta.merge]]: bag union followed by
  * multiplicity collapse.
  */
object Delta {
  val MULT = "__mult"

  /** Data columns, i.e. everything except the multiplicity. */
  def dataCols(df: DataFrame): Seq[String] = df.columns.toSeq.filterNot(_ == MULT)

  /** Attach __mult = 1 if the frame does not carry one yet. */
  def attach(df: DataFrame): DataFrame =
    if (df.columns.contains(MULT)) df else df.withColumn(MULT, lit(1L))

  /** Drop the multiplicity column (collapsed snapshots only). */
  def strip(df: DataFrame): DataFrame = df.drop(MULT)

  def negate(df: DataFrame): DataFrame =
    attach(df).withColumn(MULT, -col(MULT))

  /** Group identical tuples and sum multiplicities; drop zeroes. */
  def collapse(df: DataFrame): DataFrame = {
    val d = attach(df)
    val cols = dataCols(d)
    d.groupBy(cols.map(col): _*)
      .agg(sum(MULT).as(MULT))
      .filter(col(MULT) =!= 0L)
  }

  /** The `+#` merge operator: R_t +# Δ = R_t'. */
  def merge(a: DataFrame, b: DataFrame): DataFrame =
    collapse(attach(a).unionByName(attach(b)))

  /** Bag union without collapsing (cheap; collapse lazily when needed). */
  def unionAll(dfs: Seq[DataFrame]): DataFrame =
    dfs.map(attach).reduce(_ unionByName _)

  /** Expand a collapsed, all-positive relation to plain bag rows (each tuple
    * repeated `__mult` times) — used to hand results to the DuckDB oracle.
    */
  def expand(df: DataFrame): DataFrame = {
    val d = collapse(df)
    d.withColumn("__i", explode(sequence(lit(1L), col(MULT))))
      .drop("__i", MULT)
  }

  /** Empty delta with the same schema as `like` (mult attached). */
  def empty(like: DataFrame): DataFrame = attach(like).limit(0)

  private[tvr] def keyCond(l: DataFrame, lk: Seq[String], r: DataFrame, rk: Seq[String]): Column =
    lk.zip(rk).map { case (a, b) => l(a) === r(b) }.reduce(_ && _)
}
