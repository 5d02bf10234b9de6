package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite scaffold generators: the KG
  * reproduction generates its own schemas (repro.kg.KGData), but the shared
  * zipf/uniform key generators document the skew regimes our cluster-size
  * distributions model, and the oracle check below exercises the DuckDB
  * equivalence harness on a provided table.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem aggregation matches DuckDB (oracle harness sanity)") {
    // project to the compared columns: the oracle ingests rows via collect()
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select(col("l_returnflag"), col("l_quantity"))
      .limit(2000).cache()
    val agg = li.groupBy(col("l_returnflag"))
      .agg(count(lit(1)).as("cnt"), round(sum(col("l_quantity")), 2).as("qty"))
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM li GROUP BY l_returnflag",
      "li" -> li)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, seed = 5).agg(sum("l_orderkey")).head.getLong(0)
    val b = SynthData.lineitem(spark, 0.001, seed = 5).agg(sum("l_orderkey")).head.getLong(0)
    assert(a == b)
  }

  test("zipfKeys is heavily skewed toward small keys") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000).cache()
    val top = df.where(col("k") <= 10).count().toDouble / 20000
    assert(top > 0.5, s"top-10 keys carry only $top of the mass")
  }

  test("uniformKeys spreads mass evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = df.groupBy("k").count().collect().map(_.getAs[Long]("count"))
    assert(counts.length == 10)
    assert(counts.forall(c => c > 1500 && c < 2500))
  }

  test("orders keys are dense from 1 to N") {
    val df = SynthData.orders(spark, 0.001)
    val row = df.agg(min("o_orderkey"), max("o_orderkey"), count(lit(1))).head
    assert(row.getLong(0) == 1L)
    assert(row.getLong(1) == row.getLong(2))
  }
}
