package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** A base relation participating in a join.
  *
  * Wraps a DataFrame with a name and caches derived artifacts the samplers
  * need repeatedly: the row count and an `indexed` view carrying a dense
  * 0-based row id (`__rid`) used for uniform / weighted root-tuple sampling.
  *
  * Relations are assumed duplicate-free (the paper assumes joins have no
  * duplicate result tuples; our generators guarantee distinct rows).
  * Column names are globally meaningful: join attributes carry the same
  * name in every relation they appear in, and non-join attributes are
  * unique across the relations of a workload.
  */
final case class Rel(name: String, raw: DataFrame) {

  /** Cached data. Every estimator touches relations many times. */
  lazy val df: DataFrame = { val d = raw.cache(); d.count(); d }

  lazy val count: Long = df.count()

  def cols: Seq[String] = df.columns.toSeq

  /** Data with a dense, deterministic 0-based row id (`__rid`).
    *
    * The id is assigned by a total order over all columns, so it is stable
    * across recomputations — required because samplers join driver-chosen
    * ids back against this view.
    */
  lazy val indexed: DataFrame = {
    val ordered = Window.orderBy(cols.map(col): _*)
    val d = df.withColumn("__rid", row_number().over(ordered).cast("long") - 1).cache()
    d.count()
    d
  }
}
