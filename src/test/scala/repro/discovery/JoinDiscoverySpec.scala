package repro.discovery

import org.apache.spark.sql.functions.col

import repro.{Oracle, SparkSpec}
import repro.lake.{Lake, LakeTable, TableMeta}

class JoinDiscoverySpec extends SparkSpec {

  private def t(name: String, keyVals: Seq[String], extraCols: (String, Seq[String])*): LakeTable =
    LakeTable(
      TableMeta(name, "src", Vector("key"), Vector(name)),
      ("key" -> keyVals.map(Option(_)).toArray) +:
        extraCols.toVector.map { case (n, vs) => n -> vs.map(Option(_)).toArray },
    )

  private val input = t("input", Seq("a", "b", "c", "d"), "target" -> Seq("1", "2", "3", "4"))
  private val full = t("full", Seq("a", "b", "c", "d"), "v" -> Seq("10", "20", "30", "40"))
  private val partial = t("partial", Seq("a", "b", "x", "y"), "w" -> Seq("5", "6", "7", "8"))
  private val disjoint = t("disjoint", Seq("p", "q", "r", "s"), "u" -> Seq("1", "1", "1", "1"))

  private def lakeOf(ts: LakeTable*) = Lake(ts.toVector)

  test("joinablePairs finds fully-contained columns") {
    val pairs = JoinDiscovery.joinablePairs(lakeOf(input, full).keyCellsDf(spark), 0.9)
    assert(pairs.exists(p => p.leftTable == "input" && p.rightTable == "full" && p.containment == 1.0))
  }

  test("joinablePairs respects the containment threshold") {
    val cells = lakeOf(input, partial).keyCellsDf(spark)
    val strict = JoinDiscovery.joinablePairs(cells, 0.9)
    assert(!strict.exists(p => p.leftTable == "input" && p.rightTable == "partial"))
    val loose = JoinDiscovery.joinablePairs(cells, 0.5)
    assert(loose.exists(p => p.leftTable == "input" && p.rightTable == "partial" && p.containment == 0.5))
  }

  test("joinablePairs never pairs a table with itself") {
    val pairs = JoinDiscovery.joinablePairs(lakeOf(input, full, partial).keyCellsDf(spark), 0.01)
    assert(pairs.forall(p => p.leftTable != p.rightTable))
  }

  test("joinablePairs excludes disjoint key domains") {
    val pairs = JoinDiscovery.joinablePairs(lakeOf(input, disjoint).keyCellsDf(spark), 0.01)
    assert(pairs.isEmpty)
  }

  test("joinablePairs leftTables filter restricts anchors") {
    val pairs = JoinDiscovery.joinablePairs(lakeOf(input, full, partial).keyCellsDf(spark), 0.1, Some(Seq("input")))
    assert(pairs.nonEmpty && pairs.forall(_.leftTable == "input"))
  }

  test("overlap counts match the DuckDB oracle") {
    val cells = lakeOf(input, full, partial).keyCellsDf(spark)
      .withColumnRenamed("table", "tbl").withColumnRenamed("col", "c")
    val got = JoinDiscovery
      .joinablePairsDf(
        cells.withColumnRenamed("tbl", "table").withColumnRenamed("c", "col"), 0.01)
      .select(col("leftTable"), col("rightTable"), col("overlap").cast("string").as("overlap"))
    Oracle.assertEquivalent(
      got,
      """WITH dc AS (SELECT DISTINCT tbl, c, value FROM cells WHERE value IS NOT NULL)
        |SELECT l.tbl AS leftTable, r.tbl AS rightTable, CAST(COUNT(*) AS VARCHAR) AS overlap
        |FROM dc l JOIN dc r ON l.value = r.value AND l.tbl <> r.tbl
        |GROUP BY l.tbl, r.tbl""".stripMargin,
      "cells" -> cells.select("tbl", "c", "value"),
    )
  }

  test("candidatesFor returns one candidate per non-key column of joinable tables") {
    val multi = t("multi", Seq("a", "b", "c", "d"), "v1" -> Seq("1", "2", "3", "4"), "v2" -> Seq("9", "8", "7", "6"))
    val cands = JoinDiscovery.candidatesFor(spark, input, lakeOf(multi, disjoint), 0.5)
    assert(cands.map(c => (c.table, c.valueCol)).toSet == Set(("multi", "v1"), ("multi", "v2")))
  }

  test("candidatesFor assigns deterministic, unique ids") {
    val cands1 = JoinDiscovery.candidatesFor(spark, input, lakeOf(full, partial), 0.1)
    val cands2 = JoinDiscovery.candidatesFor(spark, input, lakeOf(full, partial), 0.1)
    assert(cands1.map(c => (c.id, c.table, c.valueCol)) == cands2.map(c => (c.id, c.table, c.valueCol)))
    assert(cands1.map(_.id).distinct.size == cands1.size)
  }

  test("candidatesFor admits approximate (erroneous) matches at low threshold") {
    val noisy = t("noisy", Seq("a", "x1", "x2", "x3"), "v" -> Seq("1", "2", "3", "4"))
    val loose = JoinDiscovery.candidatesFor(spark, input, lakeOf(noisy), 0.2)
    assert(loose.exists(_.table == "noisy"))
    val strict = JoinDiscovery.candidatesFor(spark, input, lakeOf(noisy), 0.5)
    assert(!strict.exists(_.table == "noisy"))
  }

  test("two-hop discovery chains through a bridge table") {
    val bridge = t("bridge", Seq("a", "b", "c", "d"),
      "district" -> Seq("d1", "d1", "d2", "d2"), "bname" -> Seq("n1", "n2", "n3", "n4"))
    val far = t("far", Seq("d1", "d2"), "pop" -> Seq("100", "200"))
    // far joins bridge via bridge.district ↔ far.key: register district as a key col of bridge.
    val bridgeKeyed = bridge.copy(meta = bridge.meta.copy(keyCols = Vector("key", "district")))
    val cands = JoinDiscovery.candidatesFor(spark, input, lakeOf(bridgeKeyed, far), 0.5, maxHops = 2)
    val twoHop = cands.filter(_.hops == 2)
    assert(twoHop.exists(c => c.table == "far" && c.valueCol == "pop"))
    assert(cands.exists(c => c.hops == 1 && c.table == "bridge" && c.valueCol == "bname"))
  }

  test("maxHops=1 yields only single-hop paths") {
    val cands = JoinDiscovery.candidatesFor(spark, input, lakeOf(full, partial), 0.1, maxHops = 1)
    assert(cands.forall(_.hops == 1))
  }

  test("candidate names are unique and reference their table") {
    val cands = JoinDiscovery.candidatesFor(spark, input, lakeOf(full, partial), 0.1)
    assert(cands.map(_.name).distinct.size == cands.size)
    assert(cands.forall(c => c.name.contains(c.table) && c.name.contains(c.valueCol)))
  }
}
