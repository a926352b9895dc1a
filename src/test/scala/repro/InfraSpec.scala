package repro

import org.apache.spark.sql.functions._

/** Provided infrastructure: SynthData determinism and the DuckDB Oracle's
  * ability to catch wrong results (not just run queries).
  */
class InfraSpec extends SparkSpec {

  test("SynthData.lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, 1).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, 0.001, 1).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("SynthData tables have the expected cardinalities at sf=0.001") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("zipfKeys is skewed, uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > 3 * u, s"zipf top key $z should dominate uniform top key $u")
  }

  test("Oracle passes on an equivalent aggregate") {
    import spark.implicits._
    val df = Seq((1, 2.0), (1, 3.0), (2, 5.0)).toDF("k", "v")
    // Oracle stages tables as VARCHAR columns: cast on the DuckDB side.
    Oracle.assertEquivalent(
      df.groupBy("k").agg(sum("v").as("s")),
      "SELECT k, sum(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
      "t" -> df)
  }

  test("Oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq((1, 2.0), (2, 5.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select($"k", ($"v" + 1).as("v")), // off by one
        "SELECT k, v FROM t",
        "t" -> df)
    }
  }

  test("Oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, 2.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select($"k".as("wrong")),
        "SELECT k FROM t",
        "t" -> df)
    }
  }
}
