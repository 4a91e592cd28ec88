package repro

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.workloads.UnionWorkload

/** Tiny, fully deterministic workloads whose joins, overlaps and unions
  * can be enumerated by hand or brute force — the unit-test counterpart of
  * the UQ1–UQ3 generators.
  */
object ToyData {

  /** Two 2-relation chain joins A ⋈_k B_j over a shared A.
    *
    * B0 and B1 share rows k ∈ 1..8 (identical payloads) and each holds 4
    * private rows, so |J0|=|J1|=12, |O_{01}|=8, |U|=16.
    */
  def toyUnion(spark: SparkSession): UnionWorkload = {
    import spark.implicits._
    val a = Rel("toy_a", (1 to 20).map(k => (k.toLong, s"A$k")).toDF("k", "atag"))
    val shared = (1 to 8).map(k => (k.toLong, k * 2L))
    val b0 = Rel("toy_b0", (shared ++ (101 to 104).map(i => (i.toLong - 100, 1000L + i)))
      .toDF("k", "bval"))
    val b1 = Rel("toy_b1", (shared ++ (105 to 108).map(i => (i.toLong - 100, 1000L + i)))
      .toDF("k", "bval"))
    UnionWorkload("toy", Seq(
      ChainJoin("toy_J0", Seq(a, b0), Seq("k")),
      ChainJoin("toy_J1", Seq(a, b1), Seq("k"))))
  }

  /** Three overlapping 2-relation chains (exercises 3-way k-overlaps). */
  def toyUnion3(spark: SparkSession): UnionWorkload = {
    import spark.implicits._
    val a = Rel("t3_a", (1 to 30).map(k => (k.toLong, s"A$k")).toDF("k", "atag"))
    def b(name: String, ks: Seq[Int]) =
      Rel(name, ks.map(k => (k.toLong, k * 3L)).toDF("k", "bval"))
    val b0 = b("t3_b0", 1 to 12)
    val b1 = b("t3_b1", 7 to 20)
    val b2 = b("t3_b2", (10 to 24).toSeq)
    UnionWorkload("toy3", Seq(
      ChainJoin("t3_J0", Seq(a, b0), Seq("k")),
      ChainJoin("t3_J1", Seq(a, b1), Seq("k")),
      ChainJoin("t3_J2", Seq(a, b2), Seq("k"))))
  }

  /** A small star join: root r(k, rv) with children s(k, sv) and t(k, tv),
    * with skew in the children so exact weights differ per root tuple.
    */
  def toyStar(spark: SparkSession): AcyclicJoin = {
    import spark.implicits._
    val r = Rel("star_r", (1 to 10).map(k => (k.toLong, s"R$k")).toDF("k", "rv"))
    val s = Rel("star_s", (1 to 10).flatMap(k => (0 until (k % 3) + 1).map(i => (k.toLong, k * 10L + i)))
      .toDF("k", "sv"))
    val t = Rel("star_t", (1 to 8).flatMap(k => (0 until (k % 2) + 1).map(i => (k.toLong, k * 100L + i)))
      .toDF("k", "tv"))
    AcyclicJoin("toy_star", JoinTree(r, Seq(
      JoinEdge(Seq("k"), JoinTree(s, Nil)),
      JoinEdge(Seq("k"), JoinTree(t, Nil)))))
  }

  /** The base relations of the triangle query r(a,b) ⋈ s(b,c) ⋈ t(c,a). */
  def toyTriangleRels(spark: SparkSession): (Rel, Rel, Rel) = {
    import spark.implicits._
    val r = Rel("tri_r", (for (a <- 1 to 6; b <- 1 to 6 if (a + b) % 2 == 0)
      yield (a.toLong, b.toLong)).toDF("a", "b"))
    val s = Rel("tri_s", (for (b <- 1 to 6; c <- 1 to 6 if (b * c) % 3 != 1)
      yield (b.toLong, c.toLong)).toDF("b", "c"))
    val t = Rel("tri_t", (for (c <- 1 to 6; a <- 1 to 6 if (c + 2 * a) % 4 != 0)
      yield (c.toLong, a.toLong)).toDF("c", "a"))
    (r, s, t)
  }

  /** Triangle query r(a,b) ⋈ s(b,c) ⋈ t(c,a) — the cyclic-join test case,
    * built by breaking the cycle with t as the residual (§8.2).
    */
  def toyTriangle(spark: SparkSession): CyclicJoin = {
    val (r, s, t) = toyTriangleRels(spark)
    CyclicJoin("toy_triangle", JoinTree(r, Seq(JoinEdge(Seq("b"), JoinTree(s, Nil)))),
      Seq(t), Seq.empty)
  }
}
