package repro

import org.apache.spark.sql.functions._

/** The DuckDB oracle itself: agreements pass, disagreements throw. */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    Seq((1L, "a", 2.5), (2L, "b", 3.5), (3L, "a", 4.0)).toDF("id", "tag", "v")
  }

  test("equivalent aggregate passes") {
    Oracle.assertEquivalent(
      df.groupBy("tag").agg(count(lit(1)).as("c"), sum("v").as("s")),
      "SELECT tag AS tag, count(*) AS c, sum(CAST(v AS DOUBLE)) AS s FROM t GROUP BY tag",
      "t" -> df)
  }

  test("row mismatch is detected") {
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.filter(col("id") > 1),
        "SELECT id AS id, tag AS tag, v AS v FROM t",
        "t" -> df)
    }
  }

  test("column mismatch is detected") {
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select(col("id").as("wrong")),
        "SELECT id AS id FROM t",
        "t" -> df)
    }
  }

  test("null values canonicalize consistently") {
    import spark.implicits._
    val withNull = Seq((1L, Some("x")), (2L, None)).toDF("id", "s")
    Oracle.assertEquivalent(
      withNull,
      "SELECT id AS id, s AS s FROM t",
      "t" -> withNull)
  }
}

/** The provided SynthData generators (extended, not replaced, by the
  * workload generators): determinism and schema sanity.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.002, seed = 3).agg(sum("l_orderkey")).head.getLong(0)
    val b = SynthData.lineitem(spark, 0.002, seed = 3).agg(sum("l_orderkey")).head.getLong(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, 0.002).count() * 2 <= SynthData.orders(spark, 0.004).count() + 2)
    assert(SynthData.customer(spark, 0.002).count() > 0)
    assert(SynthData.part(spark, 0.002).count() > 0)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
      .groupBy("k").count().agg(max("count")).head.getLong(0)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
      .groupBy("k").count().agg(max("count")).head.getLong(0)
    assert(z > 3 * u, s"zipf max degree $z should dwarf uniform $u")
  }

  test("foreign keys land in the referenced domain") {
    val o = SynthData.orders(spark, 0.002)
    val nCust = SynthData.customer(spark, 0.002).count()
    val bad = o.filter(col("o_custkey") < 1 || col("o_custkey") > nCust + 1).count()
    assert(bad == 0)
  }
}
