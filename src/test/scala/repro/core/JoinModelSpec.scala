package repro.core

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, ToyData}
import repro.core.union.FullJoinUnion
import repro.core.walk.{JTuple, WanderJoin}

/** The join tree model: full joins (Oracle-checked against DuckDB),
  * membership probes, output schemas, cyclic decomposition.
  */
class JoinModelSpec extends SparkSpec {

  private lazy val toy = ToyData.toyUnion(spark)
  private lazy val toy3 = ToyData.toyUnion3(spark)

  test("chain fullJoin matches DuckDB") {
    val j = toy.joins.head.asInstanceOf[ChainJoin]
    Oracle.assertEquivalent(
      j.fullJoin,
      "SELECT a.k AS k, a.atag AS atag, b.bval AS bval FROM toy_a a JOIN toy_b0 b ON a.k = b.k",
      "toy_a" -> j.rels(0).df, "toy_b0" -> j.rels(1).df)
  }

  test("star fullJoin matches DuckDB") {
    val j = ToyData.toyStar(spark)
    Oracle.assertEquivalent(
      j.fullJoin,
      "SELECT r.k AS k, r.rv AS rv, s.sv AS sv, t.tv AS tv " +
        "FROM star_r r JOIN star_s s ON r.k = s.k JOIN star_t t ON r.k = t.k",
      "star_r" -> j.relations(0).df, "star_s" -> j.relations(1).df,
      "star_t" -> j.relations(2).df)
  }

  test("triangle fullJoin matches DuckDB") {
    val j = ToyData.toyTriangle(spark)
    val (r, s, t) = ToyData.toyTriangleRels(spark)
    Oracle.assertEquivalent(
      j.fullJoin.select("a", "b", "c"),
      "SELECT r.a AS a, r.b AS b, s.c AS c FROM tri_r r " +
        "JOIN tri_s s ON r.b = s.b JOIN tri_t t ON s.c = t.c AND r.a = t.a",
      "tri_r" -> r.df, "tri_s" -> s.df, "tri_t" -> t.df)
  }

  test("output schema keeps each attribute once, pre-order") {
    val j = toy.joins.head
    assert(j.outputCols == Seq("k", "atag", "bval"))
    val star = ToyData.toyStar(spark)
    assert(star.outputCols == Seq("k", "rv", "sv", "tv"))
  }

  test("membership probe agrees with the materialized join") {
    val j0 = toy.joins(0)
    val j1 = toy.joins(1)
    val cols = WanderJoin.canonCols(j0)
    def keysOf(j: JoinSpec): Set[String] =
      j.fullJoin.select(cols.map(col): _*).collect().map(r =>
        IndexedSeq.range(0, cols.size).map(r.get).map(String.valueOf).mkString("␞")).toSet
    val k0 = keysOf(j0)
    val k1 = keysOf(j1)
    val t0 = j0.fullJoin.select(cols.map(col): _*).collect().map(r =>
      JTuple(IndexedSeq.range(0, cols.size).map(r.get), 1.0)).toSeq
    // every tuple of J0 is a member of J0…
    assert(WanderJoin.membership(j0, t0) == k0)
    // …and its members in J1 are exactly the overlap
    assert(WanderJoin.membership(j1, t0) == (k0 intersect k1))
  }

  test("membership probe on empty candidates") {
    assert(WanderJoin.membership(toy.joins.head, Seq.empty) == Set.empty[String])
  }

  test("FullJoinUnion: exact toy sizes, overlap and union") {
    val fju = new FullJoinUnion(toy.joins)
    assert(fju.sizes == Seq(12L, 12L))
    assert(fju.overlap(Set(0, 1)) == 8L)
    assert(fju.unionSize == 16L)
    val p = fju.params
    assert(p.unionSize == 16.0)
    assert(p.unionSizeByK == 16.0)
    assert(p.coverSizes == IndexedSeq(12.0, 4.0))
    assert(p.alphas.sum > 0.999 && p.alphas.sum < 1.001)
  }

  test("FullJoinUnion: union against DuckDB") {
    val fju = new FullJoinUnion(toy.joins)
    Oracle.assertEquivalent(
      fju.unionDf,
      "SELECT a.atag AS atag, a.k AS k, b.bval AS bval FROM toy_a a JOIN toy_b0 b ON a.k = b.k " +
        "UNION SELECT a.atag, a.k, b.bval FROM toy_a a JOIN toy_b1 b ON a.k = b.k",
      "toy_a" -> toy.joins(0).relations(0).df,
      "toy_b0" -> toy.joins(0).relations(1).df,
      "toy_b1" -> toy.joins(1).relations(1).df)
  }

  test("FullJoinUnion on three joins: k-overlap structure is consistent") {
    val fju = new FullJoinUnion(toy3.joins)
    val p = fju.params
    // brute-force union of key ranges: 1..24 (b0:1-12, b1:7-20, b2:10-24)
    assert(fju.unionSize == 24L)
    assert(p.unionSizeByK == 24.0)
    assert(fju.overlap(Set(0, 1)) == 6)  // 7..12
    assert(fju.overlap(Set(0, 2)) == 3)  // 10..12
    assert(fju.overlap(Set(1, 2)) == 11) // 10..20
    assert(fju.overlap(Set(0, 1, 2)) == 3) // 10..12
  }

  test("exact uniform union sampling returns only union tuples") {
    val fju = new FullJoinUnion(toy.joins)
    val sample = fju.sampleUnion(200, seed = 5)
    assert(sample.size == 200)
    assert(sample.forall(t => fju.unionKeys.contains(t.key)))
  }

  test("cyclic residual materialization preserves the join result") {
    val j = ToyData.toyTriangle(spark)
    import spark.implicits._
    val r = j.root.rel.df.as("r")
    val expect = j.root.rel.df
      .join(j.root.children.head.child.rel.df, "b")
      .join(j.residual.df, Seq("c", "a"))
      .count()
    assert(j.fullJoin.count() == expect)
    assert(j.fullJoin.count() > 0)
  }
}
