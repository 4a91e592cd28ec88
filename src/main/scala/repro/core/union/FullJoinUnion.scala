package repro.core.union

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.core.walk.{JTuple, WanderJoin}

/** The FullJoinUnion baseline (§9): materialize every join, compute exact
  * sizes, exact overlaps of every subset (`INTERSECT`), the exact set
  * union (`UNION` + `distinct`) and exact uniform samples. This is the
  * ground truth the estimators are scored against — and the expensive
  * brute force the framework exists to avoid.
  */
final class FullJoinUnion(val joins: Seq[JoinSpec]) {
  val n: Int = joins.size
  val cols: Seq[String] = WanderJoin.canonCols(joins.head)

  lazy val joinDfs: Seq[DataFrame] =
    joins.map(j => j.fullJoin.select(cols.map(col): _*).cache())

  lazy val sizes: Seq[Long] = joinDfs.map(_.count())

  private val overlapCache = scala.collection.mutable.Map.empty[Set[Int], Long]

  /** |O_Δ| = |∩_{j∈Δ} J_j| exactly. */
  def overlap(delta: Set[Int]): Long = overlapCache.getOrElseUpdate(delta, {
    if (delta.size == 1) sizes(delta.head)
    else delta.toSeq.sorted.map(joinDfs).reduceLeft(_ intersect _).count()
  })

  /** Exact parameters for every non-empty Δ ⊆ S. */
  lazy val params: UnionParams = {
    val overlaps = (1 to n).flatMap { k =>
      (0 until n).combinations(k).map(idx => idx.toSet -> overlap(idx.toSet).toDouble)
    }.toMap
    UnionParams(n, overlaps)
  }

  lazy val unionDf: DataFrame = joinDfs.reduce(_ union _).distinct().cache()

  lazy val unionSize: Long = unionDf.count()

  /** Canonical keys of the whole union (test-scale only). */
  lazy val unionKeys: Set[String] = unionDf.collect().iterator.map { r =>
    IndexedSeq.range(0, cols.size).map(r.get).map(String.valueOf).mkString("␞")
  }.toSet

  /** Exact uniform i.i.d. sample (with replacement) from the union. */
  def sampleUnion(count: Int, seed: Long): IndexedSeq[JTuple] = {
    val indexed = Rel("__union", unionDf).indexed
    val rng = new java.util.Random(seed)
    val rids = IndexedSeq.fill(count)(rng.nextLong().abs % unionSize)
    val byId = rids.groupBy(identity).map { case (k, v) => (k, v.size) }
    val spark = unionDf.sparkSession
    import spark.implicits._
    val want = byId.toSeq.toDF("__rid", "__copies")
    val rows = indexed.join(want, "__rid").collect()
    rows.iterator.flatMap { r =>
      val copies = r.getAs[Int]("__copies")
      val vals = IndexedSeq.range(0, cols.size).map(i => r.get(r.fieldIndex(cols(i))))
      Iterator.fill(copies)(JTuple(vals, 1.0 / unionSize))
    }.toIndexedSeq
  }
}
