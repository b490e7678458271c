package repro.profile

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, StringType, StructField, StructType}
import scala.util.hashing.MurmurHash3

import repro.core.{AugmentEngine, Candidate}
import repro.util.Stats

/** The vector of data profiles of every candidate augmentation (§II-C).
  *
  * Five profiles, all normalised to [0,1]:
  *   - `corr`    |Pearson correlation| of the augmented column with the
  *               task's target attribute, on a small sample
  *   - `mi`      normalised mutual information with the target (equi-rank
  *               binned), on the same sample
  *   - `embed`   semantic similarity of the candidate table to `D_in`
  *               (hashed-token embedding cosine; BERT substitute)
  *   - `meta`    metadata similarity: attribute-name Jaccard and source
  *               match (the paper's syntactic Ver/S4-style profile)
  *   - `overlap` fraction of sampled `D_in` keys with a join match — the
  *               cardinality-after-augmentation profile
  */
final case class Profiles(names: Vector[String], byId: Map[Int, Array[Double]]) {
  def dim: Int = names.length
  def of(c: Candidate): Array[Double] = byId(c.id)
  def profileIndex(name: String): Int = names.indexOf(name)
}

object Profiler {

  val ProfileNames: Vector[String] = Vector("corr", "mi", "embed", "meta", "overlap")

  /** Deterministic sample of `n` row indices of the input (pseudo-shuffle
    * by murmur hash, as the paper profiles "a random sample of 100
    * records").
    */
  def sampleIndices(nRows: Int, n: Int, seed: Long): Array[Int] =
    (0 until nRows).sortBy(i => MurmurHash3.stringHash(s"$seed:$i")).take(n).toArray.sorted

  /** Compute the profile vector of every candidate.
    *
    * All 1-hop candidates joining through their table's primary key are
    * profiled in a constant number of Spark jobs over the lake's tall cell
    * view (join with the input sample → dedup → `corr`/count aggregation,
    * plus an equi-rank binned histogram for MI). Remaining candidates
    * (multi-hop paths) are materialised through the engine and profiled
    * with the identical driver-side estimators.
    */
  def profileAll(
      spark: SparkSession,
      engine: AugmentEngine,
      cands: Seq[Candidate],
      targetCol: String,
      sampleSize: Int = 100,
      bins: Int = 8,
      seed: Long = 17,
  ): Profiles = {
    val input = engine.input
    val idx = sampleIndices(input.nRows, sampleSize, seed)
    val target = input.numeric(targetCol)

    val (batchable, _) = cands.partition { c =>
      c.hops == 1 &&
        engine.lake.table(c.edges.head.rightTable).meta.keyCols.headOption.contains(c.edges.head.rightKeyCol)
    }
    val batchableIds = batchable.map(_.id).toSet

    val fromBatch: Map[(String, String, String), (Double, Double, Double)] =
      if (batchable.isEmpty) Map.empty
      else batchable.groupBy(_.edges.head.leftCol).flatMap { case (leftCol, cs) =>
        batchProfiles(spark, engine, cs, leftCol, targetCol, idx, bins)
          .map { case ((t, vc), v) => (leftCol, t, vc) -> v }
      }

    val byId = cands.map { c =>
      val (corrV, miV, overlapV) =
        if (batchableIds.contains(c.id))
          fromBatch.getOrElse((c.edges.head.leftCol, c.table, c.valueCol), (0.0, 0.0, 0.0))
        else {
          val colVals = engine.column(c)
          val xs = idx.map(i => colVals(i).flatMap(_.toDoubleOption))
          val ys = idx.map(i => target(i))
          // Overlap counts joined values even when not numeric.
          val matched = idx.count(i => colVals(i).isDefined)
          (
            math.abs(Stats.pearson(xs, ys)),
            Stats.normalizedMutualInformation(xs, ys, bins),
            matched.toDouble / idx.length,
          )
        }
      val tMeta = engine.lake.table(c.table).meta
      val embedV = TokenEmbedding.similarity(
        input.meta.vocabulary ++ input.columnNames,
        tMeta.vocabulary ++ engine.lake.table(c.table).columnNames,
      )
      val metaV = metadataSimilarity(
        input.columnNames.toSet, input.meta.source,
        engine.lake.table(c.table).columnNames.toSet, tMeta.source,
      )
      c.id -> Array(
        Stats.clamp01(corrV), Stats.clamp01(miV), Stats.clamp01(embedV),
        Stats.clamp01(metaV), Stats.clamp01(overlapV),
      )
    }.toMap

    Profiles(ProfileNames, byId)
  }

  /** Attribute-name Jaccard blended with a source-equality indicator. */
  def metadataSimilarity(aAttrs: Set[String], aSource: String, bAttrs: Set[String], bSource: String): Double = {
    val tokensA = aAttrs.flatMap(_.toLowerCase.split("[_\\s]+"))
    val tokensB = bAttrs.flatMap(_.toLowerCase.split("[_\\s]+"))
    val jac =
      if (tokensA.isEmpty || tokensB.isEmpty) 0.0
      else tokensA.intersect(tokensB).size.toDouble / tokensA.union(tokensB).size
    0.5 * jac + 0.5 * (if (aSource == bSource) 1.0 else 0.0)
  }

  /** One batched pass over all candidates sharing `leftCol`: returns
    * (table, valueCol) → (|corr|, normalised MI, overlap fraction).
    */
  private def batchProfiles(
      spark: SparkSession,
      engine: AugmentEngine,
      cs: Seq[Candidate],
      leftCol: String,
      targetCol: String,
      idx: Array[Int],
      bins: Int,
  ): Map[(String, String), (Double, Double, Double)] = {
    val input = engine.input
    val keys = input.column(leftCol)
    val target = input.numeric(targetCol)
    val sampleSchema = StructType(Seq(
      StructField("skey", StringType, nullable = true),
      StructField("target", DoubleType, nullable = true),
    ))
    val sampleRows = idx.toSeq.map { i =>
      Row(keys(i).orNull, target(i).map(Double.box).orNull)
    }
    val sampleDf = spark.createDataFrame(spark.sparkContext.parallelize(sampleRows, 2), sampleSchema)

    val tables = cs.map(_.table).distinct
    val cells = engine.lake.valueCellsDf(spark).where(col("table").isin(tables: _*))

    // Dedup duplicate join keys exactly like AugmentEngine (min per key).
    // Overlap counts every joined (string) value; corr/MI use only the
    // numerically-parseable subset (try_cast — entity columns etc. stay
    // joinable but contribute no correlation signal).
    val dedup = sampleDf
      .join(cells, sampleDf("skey") === cells("key"))
      .groupBy(col("table"), col("valueCol"), col("skey"), col("target"))
      .agg(min(col("value")).as("vs"))
      .where(col("vs").isNotNull && col("target").isNotNull)
      .withColumn("v", expr("try_cast(vs AS DOUBLE)"))
      .cache()

    // Correlation from sufficient statistics (computed distributedly, the
    // final ratio guarded on the driver) — Spark's `corr` divides by the
    // variance and throws under ANSI mode when a small matched group is
    // constant.
    val statsRows = dedup
      .groupBy("table", "valueCol")
      .agg(
        countDistinct(col("skey")).as("matchedKeys"),
        count(col("v")).as("n"),
        sum(col("v")).as("sx"),
        sum(col("v") * col("v")).as("sxx"),
        sum(when(col("v").isNotNull, col("target"))).as("sy"),
        sum(when(col("v").isNotNull, col("target") * col("target"))).as("syy"),
        sum(col("v") * col("target")).as("sxy"),
      )
      .collect()

    val numeric = dedup.where(col("v").isNotNull)
    val wv = Window.partitionBy("table", "valueCol").orderBy("v")
    val wt = Window.partitionBy("table", "valueCol").orderBy("target")
    val histRows = numeric
      .withColumn("bx", least(lit(bins - 1), floor(percent_rank().over(wv) * bins)).cast("int"))
      .withColumn("by", least(lit(bins - 1), floor(percent_rank().over(wt) * bins)).cast("int"))
      .groupBy("table", "valueCol", "bx", "by")
      .agg(count(lit(1)).as("c"))
      .collect()
    dedup.unpersist()

    val hists = histRows
      .groupBy(r => (r.getString(0), r.getString(1)))
      .view
      .mapValues(_.map(r => (r.getInt(2), r.getInt(3), r.getLong(4))).toSeq)
      .toMap

    statsRows.map { r =>
      val k = (r.getString(0), r.getString(1))
      val matchedKeys = r.getLong(2)
      val n = r.getLong(3)
      val corrV =
        if (n < 3 || r.isNullAt(4)) 0.0
        else {
          val nn = n.toDouble
          val sx = r.getDouble(4); val sxx = r.getDouble(5)
          val sy = r.getDouble(6); val syy = r.getDouble(7)
          val sxy = r.getDouble(8)
          val varX = nn * sxx - sx * sx
          val varY = nn * syy - sy * sy
          if (varX < 1e-12 || varY < 1e-12) 0.0
          else math.abs((nn * sxy - sx * sy) / math.sqrt(varX * varY))
        }
      val miV =
        if (n < 4) 0.0
        else hists.get(k).map(h => Stats.miFromJointCounts(h, bins) / math.log(bins.toDouble)).getOrElse(0.0)
      k -> ((corrV, miV, matchedKeys.toDouble / idx.length))
    }.toMap
  }
}
