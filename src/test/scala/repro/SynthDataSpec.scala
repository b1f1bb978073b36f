package repro

import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

/** Sanity + oracle checks for the provided TPC-H-lite generators (they back
  * auxiliary relational oracle tests and document the Oracle workflow).
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li = { val d = SynthData.lineitem(spark, sf = 0.002).cache(); d.count(); d }
  private lazy val ord = { val d = SynthData.orders(spark, sf = 0.002).cache(); d.count(); d }

  test("lineitem row count scales with sf") {
    assert(li.count() == 12000)
  }

  test("lineitem values stay in domain") {
    val r = li.agg(min("l_quantity"), max("l_quantity"), min("l_discount"), max("l_discount")).head()
    assert(r.getDouble(0) >= 1.0 && r.getDouble(1) <= 51.0)
    assert(r.getDouble(2) >= 0.0 && r.getDouble(3) <= 0.10)
  }

  test("oracle: grouped lineitem aggregate matches DuckDB") {
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast(LongType).as("n"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT l_returnflag, CAST(count(*) AS BIGINT) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li.select("l_returnflag"))
  }

  test("oracle: filtered count with predicate matches DuckDB") {
    val sparkDf = ord.filter(col("o_orderstatus") === "O")
      .agg(count(lit(1)).cast(LongType).as("n"))
    Oracle.assertEquivalent(sparkDf,
      "SELECT CAST(count(*) AS BIGINT) AS n FROM orders WHERE o_orderstatus = 'O'",
      "orders" -> ord.select("o_orderkey", "o_orderstatus"))
  }

  test("zipf keys are skewed (top key much heavier than uniform share)") {
    val df = SynthData.zipfKeys(spark, 20000, 1000)
    val top = df.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    assert(top > 20000 / 1000 * 5, s"zipf top key count $top should far exceed the uniform share")
  }

  test("uniform keys cover the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, 20000, 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max < counts.min * 2)
  }
}
