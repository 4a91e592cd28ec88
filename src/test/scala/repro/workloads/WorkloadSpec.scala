package repro.workloads

import repro.{Oracle, SparkSpec}
import repro.core._
import repro.core.union.FullJoinUnion

/** UQ1–UQ3 generator invariants: schema alignment, Oracle-checked join
  * results, overlap monotonicity in the overlap knob, determinism.
  */
class WorkloadSpec extends SparkSpec {

  test("UQ1: five chain joins with identical output schemas") {
    val w = UnionWorkloads.uq1(spark, sf = 0.004, overlap = 0.3)
    assert(w.joins.size == 5)
    val schemas = w.joins.map(_.outputCols.toSet)
    assert(schemas.forall(_ == schemas.head))
    assert(w.joins.forall(_.isInstanceOf[ChainJoin]))
  }

  test("UQ1 join matches DuckDB five-way join") {
    val w = UnionWorkloads.uq1(spark, sf = 0.004, overlap = 0.3)
    val j = w.joins.head.asInstanceOf[ChainJoin]
    val Seq(n, s, c, o, l) = j.rels
    Oracle.assertEquivalent(
      j.fullJoin,
      """SELECT n.nationkey AS nationkey, n.n_comment AS n_comment,
        |       s.suppkey AS suppkey, s.s_comment AS s_comment,
        |       c.custkey AS custkey, c.c_comment AS c_comment,
        |       o.orderkey AS orderkey, o.o_comment AS o_comment,
        |       l.lineid AS lineid, l.l_qty AS l_qty, l.l_tag AS l_tag
        |FROM nation n
        |JOIN supplier s ON n.nationkey = s.nationkey
        |JOIN customer c ON s.nationkey = c.nationkey
        |JOIN orders o ON c.custkey = o.custkey
        |JOIN lineitem l ON o.orderkey = l.orderkey""".stripMargin,
      "nation" -> n.df, "supplier" -> s.df, "customer" -> c.df,
      "orders" -> o.df, "lineitem" -> l.df)
  }

  test("UQ1: overlap scale is monotone in the knob") {
    def overlapRatio(ov: Double): Double = {
      val w = UnionWorkloads.uq1(spark, sf = 0.003, overlap = ov)
      val fju = new FullJoinUnion(w.joins.take(2))
      fju.overlap(Set(0, 1)).toDouble / math.max(1L, fju.sizes.min)
    }
    val low = overlapRatio(0.1)
    val high = overlapRatio(0.7)
    assert(high > low, s"overlap ratio did not grow: $low vs $high")
  }

  test("UQ1: private lineitems never collide across joins") {
    val w = UnionWorkloads.uq1(spark, sf = 0.003, overlap = 0.3)
    val fju = new FullJoinUnion(w.joins)
    // overlap of any pair is at most the shared-lineitem join part; tuples
    // with private tags must be exclusive
    val pair = fju.joinDfs(0).intersect(fju.joinDfs(1))
    import org.apache.spark.sql.functions.col
    assert(pair.filter(col("l_tag") =!= "S").count() == 0)
  }

  test("UQ2: three joins on shared data with overlapping predicates") {
    val w = UnionWorkloads.uq2(spark, sf = 0.004)
    assert(w.joins.size == 3)
    val fju = new FullJoinUnion(w.joins)
    assert(fju.sizes.forall(_ > 0))
    // predicate ranges: [1,60], [30,80], [50,100]; triple overlap = [50,60]
    assert(fju.overlap(Set(0, 1, 2)) > 0)
    assert(fju.overlap(Set(0, 1)) >= fju.overlap(Set(0, 1, 2)))
    // J0∩J2 = [50,60] = the triple overlap — a strong structural identity
    assert(fju.overlap(Set(0, 2)) == fju.overlap(Set(0, 1, 2)))
  }

  test("UQ2 join matches DuckDB (predicate pushed down)") {
    val w = UnionWorkloads.uq2(spark, sf = 0.004)
    val j = w.joins(1).asInstanceOf[ChainJoin]
    val Seq(r, n, s, ps, p) = j.rels
    Oracle.assertEquivalent(
      j.fullJoin,
      """SELECT r.regionkey AS regionkey, r.r_comment AS r_comment,
        |       n.nationkey AS nationkey, n.n_comment AS n_comment,
        |       s.suppkey AS suppkey, s.s_comment AS s_comment,
        |       ps.psid AS psid, ps.ps_avail AS ps_avail,
        |       p.partkey AS partkey, p.p_size AS p_size, p.p_comment AS p_comment
        |FROM region r
        |JOIN nation n ON r.regionkey = n.regionkey
        |JOIN supplier s ON n.nationkey = s.nationkey
        |JOIN partsupp ps ON s.suppkey = ps.suppkey
        |JOIN part p ON ps.partkey = p.partkey
        |WHERE CAST(p.p_size AS BIGINT) BETWEEN 30 AND 80""".stripMargin,
      "region" -> r.df, "nation" -> n.df, "supplier" -> s.df,
      "partsupp" -> ps.df, "part" -> p.df)
  }

  test("UQ3: star + chains share the output schema") {
    val w = UnionWorkloads.uq3(spark, sf = 0.004)
    assert(w.joins.size == 3)
    val schemas = w.joins.map(_.outputCols.toSet)
    assert(schemas.forall(_ == schemas.head))
    assert(w.joins.head.isInstanceOf[AcyclicJoin])
    assert(w.joins.tail.forall(_.isInstanceOf[ChainJoin]))
  }

  test("UQ3 star join matches DuckDB") {
    val w = UnionWorkloads.uq3(spark, sf = 0.004)
    val j = w.joins.head
    val rels = j.relations
    Oracle.assertEquivalent(
      j.fullJoin,
      """SELECT cb.custkey AS custkey, cb.nationkey AS nationkey,
        |       ba.acctbal AS acctbal, o.oid AS oid, o.totalprice AS totalprice
        |FROM custbase cb
        |JOIN custbal ba ON cb.custkey = ba.custkey
        |JOIN ordersA o ON cb.custkey = o.custkey""".stripMargin,
      "custbase" -> rels(0).df, "custbal" -> rels(1).df, "ordersA" -> rels(2).df)
  }

  test("UQ3: overlap knob widens the horizontal ranges") {
    def ov(o: Double): Long = {
      val w = UnionWorkloads.uq3(spark, sf = 0.003, overlap = o)
      new FullJoinUnion(w.joins).overlap(Set(1, 2))
    }
    assert(ov(0.0) == 0, "disjoint thirds must not overlap")
    assert(ov(0.8) > 0)
  }

  test("generators are deterministic in (sf, overlap, seed)") {
    val a = UnionWorkloads.uq1(spark, sf = 0.003, overlap = 0.4)
    val b = UnionWorkloads.uq1(spark, sf = 0.003, overlap = 0.4)
    val fa = new FullJoinUnion(a.joins)
    val fb = new FullJoinUnion(b.joins)
    assert(fa.sizes == fb.sizes)
    assert(fa.unionSize == fb.unionSize)
  }

  test("UQ1 relation cardinalities scale with sf") {
    val small = UnionWorkloads.uq1(spark, sf = 0.003, overlap = 0.3)
    val big = UnionWorkloads.uq1(spark, sf = 0.006, overlap = 0.3)
    val sSmall = small.joins.head.relations.map(_.count).sum
    val sBig = big.joins.head.relations.map(_.count).sum
    assert(sBig > sSmall)
  }
}
