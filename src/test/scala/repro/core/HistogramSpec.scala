package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, ToyData}
import repro.core.histogram.{ChainForm, HistogramOverlap, Splitter}
import repro.core.stats.DegreeStats
import repro.core.union.FullJoinUnion
import repro.workloads.UnionWorkloads

/** §5 degree statistics, Theorem 4 overlap bounds, §8.1 templates and the
  * splitting method — bounds are checked for dominance over exact values
  * from FullJoinUnion, and statistics against DuckDB.
  */
class HistogramSpec extends SparkSpec {

  private lazy val toy = ToyData.toyUnion(spark)
  private lazy val toy3 = ToyData.toyUnion3(spark)
  private lazy val uq1 = UnionWorkloads.uq1(spark, sf = 0.004, overlap = 0.3)
  private lazy val uq3 = UnionWorkloads.uq3(spark, sf = 0.004)

  test("degree histogram matches DuckDB") {
    val b0 = toy.joins(0).relations(1)
    Oracle.assertEquivalent(
      DegreeStats.histogram(b0.df, "k").withColumnRenamed("deg", "deg"),
      "SELECT k AS k, count(*) AS deg FROM b0 GROUP BY k",
      "b0" -> b0.df)
  }

  test("max and avg degree match DuckDB scalars") {
    val orders = uq1.joins.head.relations(3)
    Oracle.assertEquivalent(
      DegreeStats.histogram(orders.df, "custkey").agg(max("deg").as("m"), avg("deg").as("a")),
      "SELECT max(deg) AS m, avg(deg) AS a FROM " +
        "(SELECT custkey, count(*) AS deg FROM orders GROUP BY custkey)",
      "orders" -> orders.df)
    assert(DegreeStats.maxDegree(orders.df, "custkey") >= 1)
    assert(DegreeStats.avgDegree(orders.df, "custkey") >= 1.0)
    assert(DegreeStats.avgDegree(orders.df, "custkey") <=
      DegreeStats.maxDegree(orders.df, "custkey").toDouble)
  }

  test("maxDegreeMulti on composite keys") {
    val (r, _, _) = ToyData.toyTriangleRels(spark)
    assert(DegreeStats.maxDegreeMulti(r.df, Seq("a", "b")) == 1L)
    assert(DegreeStats.maxDegreeMulti(r.df, Seq("a")) == DegreeStats.maxDegree(r.df, "a"))
  }

  test("ChainForm.aligned detects the §5.1 base case") {
    assert(ChainForm.aligned(toy.joins))
    assert(ChainForm.aligned(uq1.joins))
    assert(!ChainForm.aligned(uq3.joins)) // star + chains with different schemas
  }

  test("direct overlap bound dominates the exact overlap (toy)") {
    val fju = new FullJoinUnion(toy.joins)
    val chains = toy.joins.map(j => ChainForm.direct(j.asInstanceOf[ChainJoin]))
    val bound = HistogramOverlap.overlapBound(chains)
    assert(bound >= fju.overlap(Set(0, 1)).toDouble, s"bound $bound")
    // singleton: extended-Olken join-size bound dominates |J|
    val b0 = HistogramOverlap.overlapBound(Seq(chains(0)))
    assert(b0 >= fju.sizes(0).toDouble)
  }

  test("direct overlap bounds dominate exact overlaps on all UQ1 subsets") {
    val fju = new FullJoinUnion(uq1.joins)
    val chains = uq1.joins.map(j => ChainForm.direct(j.asInstanceOf[ChainJoin]))
    for (k <- 1 to 3; idx <- (0 until uq1.joins.size).combinations(k).take(6)) {
      val bound = HistogramOverlap.overlapBound(idx.map(chains))
      val exact = fju.overlap(idx.toSet).toDouble
      assert(bound >= exact - 1e-6, s"Δ=$idx: bound $bound < exact $exact")
    }
  }

  test("estimate() produces a full powerset of overlap estimates") {
    val p = HistogramOverlap.estimate(toy3.joins)
    assert(p.overlaps.size == 7)
    assert(p.joinSizes.forall(_ > 0))
    assert(p.unionSize > 0)
    assert(math.abs(p.alphas.sum - 1.0) < 1e-9)
  }

  test("monotonize caps supersets at the subset minimum") {
    val o = Map(Set(0) -> 10.0, Set(1) -> 20.0, Set(0, 1) -> 50.0)
    val m = HistogramOverlap.monotonize(2, o)
    assert(m(Set(0, 1)) == 10.0)
    assert(m(Set(0)) == 10.0 && m(Set(1)) == 20.0)
    // already-consistent maps are untouched
    val ok = Map(Set(0) -> 10.0, Set(1) -> 20.0, Set(0, 1) -> 5.0)
    assert(HistogramOverlap.monotonize(2, ok) == ok)
  }

  test("histogram union estimate is positive, bounded, join sizes dominate") {
    val fju = new FullJoinUnion(uq1.joins)
    val est = HistogramOverlap.estimate(uq1.joins)
    // Inclusion–exclusion over *upper bounds* has no guaranteed direction
    // for |U| (overlap overestimates subtract too much); require sanity:
    assert(est.unionSize > 0)
    assert(est.unionSize <= est.joinSizes.sum + 1e-6)
    assert(est.unionSize >= fju.unionSize * 0.1,
      s"estimated |U| ${est.unionSize} wildly below exact ${fju.unionSize}")
    // per-join size bounds DO dominate (they are genuine Olken bounds)
    uq1.joins.indices.foreach { j =>
      assert(est.joinSizes(j) >= fju.sizes(j).toDouble - 1e-6,
        s"join $j: ${est.joinSizes(j)} < ${fju.sizes(j)}")
    }
  }

  test("estimate()'s shared-scan fast path agrees with per-Δ overlapBound") {
    val n = toy3.joins.size
    val chains = toy3.joins.map(j => ChainForm.direct(j.asInstanceOf[ChainJoin]))
    val slow = (1 to n).flatMap { k =>
      (0 until n).combinations(k).map(idx =>
        idx.toSet -> HistogramOverlap.overlapBound(idx.map(chains)))
    }.toMap
    val fast = HistogramOverlap.estimate(toy3.joins).overlaps
    val slowM = HistogramOverlap.monotonize(n, slow)
    slowM.foreach { case (d, v) =>
      assert(math.abs(fast(d) - v) < 1e-6, s"Δ=$d: fast ${fast(d)} vs slow $v")
    }
  }

  test("refined (avg-degree) bound is no larger than the max-degree bound") {
    val chains = uq1.joins.map(j => ChainForm.direct(j.asInstanceOf[ChainJoin]))
    val maxB = HistogramOverlap.overlapBound(chains)
    val avgB = HistogramOverlap.overlapBound(chains, refined = true)
    assert(avgB <= maxB + 1e-6)
  }

  // ---- §8.1 templates -----------------------------------------------------

  test("attribute distances: 0 when co-located, >0 across relations") {
    val j = toy.joins.head
    assert(Splitter.dist(j, "k", "atag") == 0)
    assert(Splitter.dist(j, "k", "bval") == 0)
    assert(Splitter.dist(j, "atag", "bval") == 1)
    val star = ToyData.toyStar(spark)
    assert(Splitter.dist(star, "sv", "tv") == 2) // via the root
  }

  test("bestTemplate covers each output attribute exactly once") {
    val t = Splitter.bestTemplate(uq3.joins)
    assert(t.sorted == uq3.joins.head.outputCols.sorted)
    assert(t.distinct.size == t.size)
  }

  test("bestTemplate minimizes adjacent score on a small instance") {
    val t = Splitter.bestTemplate(toy.joins)
    def cost(order: Seq[String]) =
      order.sliding(2).map(p => Splitter.score(toy.joins, p(0), p(1))).sum
    val best = toy.joins.head.outputCols.permutations.map(cost).min
    assert(cost(t) == best)
  }

  test("split join reproduces aligned chains for UQ3 and bounds dominate") {
    val template = Splitter.bestTemplate(uq3.joins)
    val chains = uq3.joins.map(Splitter.split(_, template))
    assert(chains.forall(_.hops == template.size - 2))
    val fju = new FullJoinUnion(uq3.joins)
    // singleton bounds dominate join sizes
    uq3.joins.indices.foreach { j =>
      val b = HistogramOverlap.overlapBound(Seq(chains(j)))
      assert(b >= fju.sizes(j).toDouble - 1e-6, s"join $j bound $b < ${fju.sizes(j)}")
    }
  }

  test("fake joins are detected for pieces split from the same relation") {
    val template = Splitter.bestTemplate(uq3.joins)
    val chain = Splitter.split(uq3.joins(1), template) // cust1(custkey,nationkey,acctbal)
    assert((0 until chain.hops).exists(chain.isFake),
      "a 3-attribute relation split into two pieces must create a fake hop")
  }
}
