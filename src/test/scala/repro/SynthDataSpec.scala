package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators and the DuckDB
  * oracle plumbing itself (the graph reproduction uses its own generators;
  * this keeps the shared substrate honest).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and sized by sf") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == b.count())
    assert(a.count() == 6000)
  }

  test("oracle agrees on a lineitem aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    Oracle.assertEquivalent(
      li.groupBy("l_returnflag").agg(count(lit(1)) as "n"),
      "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle catches wrong results") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.groupBy("l_returnflag").agg((count(lit(1)) + 1) as "n"),
        "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("uniform and zipf key generators produce the requested rows") {
    assert(SynthData.uniformKeys(spark, 1000, 50).count() == 1000)
    assert(SynthData.zipfKeys(spark, 1000, 50).count() == 1000)
  }

  test("zipf keys are skewed relative to uniform") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(top > 20000 / 1000 * 5) // the hottest key is far above the mean
  }
}
