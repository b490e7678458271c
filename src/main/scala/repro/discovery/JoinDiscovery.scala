package repro.discovery

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{Candidate, JoinEdge}
import repro.lake.{Lake, LakeTable}

/** Aurum-lite: join-path discovery over a cell-level inverted index.
  *
  * The paper delegates candidate generation to Aurum; we rebuild the part
  * METAM consumes — "which (column, column) pairs join, and through which
  * paths" — as Spark dataflow: the lake's key cells are joined value-to-
  * value, grouped per column pair, and scored by containment
  * `|V_l ∩ V_r| / |V_l|`. Approximate indexes admit false positives, so a
  * low `minContainment` deliberately lets spurious (erroneous) join paths
  * through, matching the ~60% erroneous candidates the paper reports.
  */
object JoinDiscovery {

  /** A discovered joinable column pair with its containment score. */
  final case class JoinablePair(
      leftTable: String,
      leftCol: String,
      rightTable: String,
      rightCol: String,
      overlap: Long,
      containment: Double,
  )

  /** All joinable column pairs among the lake's key columns.
    *
    * @param keyCells tall (table, col, __rowid, value) DataFrame
    * @param minContainment minimum `distinct-overlap / distinct-left` ratio
    */
  def joinablePairsDf(keyCells: DataFrame, minContainment: Double,
                      leftTables: Option[Seq[String]] = None): DataFrame = {
    val distinctCells = keyCells
      .where(col("value").isNotNull)
      .select(col("table"), col("col"), col("value"))
      .distinct()
    val counts = distinctCells
      .groupBy("table", "col")
      .agg(count(lit(1)).as("n"))
    val leftCells = leftTables.fold(distinctCells)(ts => distinctCells.where(col("table").isin(ts: _*)))
    val l = leftCells.select(col("table").as("lt"), col("col").as("lc"), col("value"))
    val r = distinctCells.select(col("table").as("rt"), col("col").as("rc"), col("value"))
    l.join(r, Seq("value"))
      .where(col("lt") =!= col("rt"))
      .groupBy("lt", "lc", "rt", "rc")
      .agg(count(lit(1)).as("overlap"))
      .join(counts.select(col("table").as("lt"), col("col").as("lc"), col("n").as("ln")), Seq("lt", "lc"))
      .select(
        col("lt").as("leftTable"), col("lc").as("leftCol"),
        col("rt").as("rightTable"), col("rc").as("rightCol"),
        col("overlap"),
        (col("overlap") / col("ln")).as("containment"),
      )
      .where(col("containment") >= minContainment)
  }

  def joinablePairs(keyCells: DataFrame, minContainment: Double,
                    leftTables: Option[Seq[String]] = None): Vector[JoinablePair] =
    joinablePairsDf(keyCells, minContainment, leftTables)
      .collect()
      .map(r => JoinablePair(r.getString(0), r.getString(1), r.getString(2), r.getString(3), r.getLong(4), r.getDouble(5)))
      .sortBy(p => (p.leftTable, p.leftCol, p.rightTable, p.rightCol))
      .toVector

  /** Candidate augmentations for `input`: every non-key column reachable
    * over a join path of at most `maxHops` hops starting from one of
    * `input`'s key columns. Hop 1 uses the inverted index; hop 2 chains a
    * pair discovered among lake tables onto a hop-1 path (paper
    * Definition 3 chains of joins). Candidate ids are assigned in a
    * deterministic order.
    */
  def candidatesFor(
      spark: SparkSession,
      input: LakeTable,
      lake: Lake,
      minContainment: Double,
      maxHops: Int = 1,
  ): Vector[Candidate] = {
    require(maxHops >= 1 && maxHops <= 2, "supported join-path depth is 1 or 2")
    val inputLake = Lake(input +: lake.tables)
    // Depth-1 discovery only needs pairs anchored at the input table.
    val leftFilter = if (maxHops == 1) Some(Seq(input.meta.name)) else None
    val pairs = joinablePairs(inputLake.keyCellsDf(spark), minContainment, leftFilter)

    val hop1: Vector[Vector[JoinEdge]] = pairs
      .filter(p => p.leftTable == input.meta.name)
      .map(p => Vector(JoinEdge(p.leftCol, p.rightTable, p.rightCol)))

    val hop2: Vector[Vector[JoinEdge]] =
      if (maxHops < 2) Vector.empty
      else for {
        path <- hop1
        bridge = path.last.rightTable
        p <- pairs
        if p.leftTable == bridge && p.rightTable != input.meta.name && p.rightTable != bridge
      } yield path :+ JoinEdge(p.leftCol, p.rightTable, p.rightCol)

    val paths = (hop1 ++ hop2.distinct).distinct
    val cands = for {
      (edges, pi) <- paths.zipWithIndex
      t = lake.table(edges.last.rightTable)
      vc <- t.columnNames if !t.meta.keyCols.contains(vc)
    } yield (edges, vc)

    cands.zipWithIndex.map { case ((edges, vc), i) => Candidate(i, edges, vc) }
  }
}
