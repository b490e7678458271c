package repro.core

import org.apache.spark.sql.functions.col

import repro.{Oracle, SparkSpec}
import repro.lake.{Lake, LakeTable, TableMeta}

class AugmentSpec extends SparkSpec {

  private def t(name: String, cols: (String, Seq[Option[String]])*): LakeTable =
    LakeTable(TableMeta(name, "src", Vector("key"), Vector(name)),
      cols.toVector.map { case (n, vs) => n -> vs.toArray })

  private val input = t("input",
    "key" -> Seq(Some("a"), Some("b"), Some("c"), Some("d")),
    "target" -> Seq(Some("1"), Some("2"), Some("3"), Some("4")))

  private val right = t("right",
    "key" -> Seq(Some("a"), Some("b"), Some("b"), Some("x")),
    "v" -> Seq(Some("10"), Some("30"), Some("20"), Some("99")))

  private def engineWith(tables: LakeTable*) = new AugmentEngine(spark, input, Lake(tables.toVector))

  private val cand = Candidate(0, Vector(JoinEdge("key", "right", "key")), "v")

  test("column materialises a left join with min-dedup") {
    val eng = engineWith(right)
    // b matches two rows (30, 20) → min = "20"; c,d unmatched → None.
    assert(eng.column(cand).toSeq == Seq(Some("10"), Some("20"), None, None))
  }

  test("materializeDf matches the DuckDB left-join oracle") {
    val eng = engineWith(right)
    val got = eng.materializeDf(cand).withColumnRenamed(cand.name, "av")
      .select(col("__rowid").cast("string").as("rid"), col("av"))
    Oracle.assertEquivalent(
      got,
      """SELECT i.__rowid AS rid, MIN(r.v) AS av
        |FROM input i LEFT JOIN rt r ON i.key = r.key
        |GROUP BY i.__rowid""".stripMargin,
      "input" -> input.toDf(spark).withColumn("__rowid", col("__rowid").cast("string")),
      "rt" -> right.toDf(spark).drop("__rowid"),
    )
  }

  test("column is memoised (one materialisation per candidate)") {
    val eng = engineWith(right)
    eng.column(cand); eng.column(cand)
    assert(eng.materializations == 1)
  }

  test("prefetch batches one-hop candidates and matches per-candidate joins") {
    val other = t("other", "key" -> Seq(Some("a"), Some("c")), "w" -> Seq(Some("5"), Some("7")))
    val c2 = Candidate(1, Vector(JoinEdge("key", "other", "key")), "w")
    val engBatch = engineWith(right, other)
    engBatch.prefetch(Seq(cand, c2))
    val engLazy = engineWith(right, other)
    assert(engBatch.column(cand).toSeq == engLazy.column(cand).toSeq)
    assert(engBatch.column(c2).toSeq == engLazy.column(c2).toSeq)
    assert(engBatch.materializations == 2)
  }

  test("prefetch on an all-foreign-key table yields all-None") {
    val foreign = t("foreign", "key" -> Seq(Some("z1"), Some("z2")), "u" -> Seq(Some("1"), Some("2")))
    val c = Candidate(5, Vector(JoinEdge("key", "foreign", "key")), "u")
    val eng = engineWith(foreign)
    eng.prefetch(Seq(c))
    assert(eng.column(c).forall(_.isEmpty))
  }

  test("localTable appends candidate columns after the input columns") {
    val eng = engineWith(right)
    val lt = eng.localTable(Seq(cand))
    assert(lt.columnNames == Vector("key", "target", cand.name))
    assert(lt.column(cand.name).toSeq == Seq(Some("10"), Some("20"), None, None))
  }

  test("localTable of empty selection is the input") {
    val eng = engineWith(right)
    assert(eng.localTable(Nil).columns == input.columns)
  }

  test("augmentedDf agrees with localTable row for row") {
    val eng = engineWith(right)
    val df = eng.augmentedDf(Seq(cand)).orderBy("__rowid")
    val rows = df.select(col(cand.name)).collect().map(r => Option(r.getString(0)))
    assert(rows.toSeq == eng.column(cand).toSeq)
  }

  test("two-hop chain materialises through the bridge") {
    val bridge = t("bridge",
      "key" -> Seq(Some("a"), Some("b"), Some("c"), Some("d")),
      "district" -> Seq(Some("d1"), Some("d1"), Some("d2"), None))
    val far = t("far", "key" -> Seq(Some("d1"), Some("d2")), "pop" -> Seq(Some("100"), Some("200")))
    val c = Candidate(9, Vector(JoinEdge("key", "bridge", "key"), JoinEdge("district", "far", "key")), "pop")
    val eng = engineWith(bridge, far)
    assert(eng.column(c).toSeq == Seq(Some("100"), Some("100"), Some("200"), None))
  }

  test("candidate name encodes id, table and column") {
    assert(cand.name == "aug_0__right__v")
    assert(cand.describe.contains("right.key"))
  }

  test("candidate requires at least one hop") {
    intercept[IllegalArgumentException](Candidate(1, Vector.empty, "v"))
  }
}
