package repro.erdata

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import scala.util.Random

import repro.sim.{AttrSpec, FeatureGen}
import ErGenerators._

/** A fully assembled benchmark ER dataset: two tables, ground truth, and
  * the Magellan-style feature configuration the paper would generate.
  */
final case class ErDataset(
    name: String,
    left: DataFrame,          // id :: bigint, <attrs> :: string
    right: DataFrame,
    truth: DataFrame,         // left_id, right_id (cross-table matches)
    truthRight: DataFrame,    // right-table intra duplicates (left_id < right_id ids of the RIGHT table)
    attrs: Seq[String],
    specs: Seq[AttrSpec],
    blockAttr: String,
    blockOverlap: Int,
    blockMaxDf: Long,
) {
  def nLeft: Long  = left.count()
  def nRight: Long = right.count()
  def nMatch: Long = truth.count()
}

/** The five benchmark datasets of Table 2, as deterministic synthetic
  * generators (see DESIGN.md "Dataset substitution").
  *
  * | name | paper sizes          | here                     |
  * |------|----------------------|--------------------------|
  * | FZ   | 533 x 331, 112 M     | same                     |
  * | DA   | 2616 x 2294, ~2224 M | same                     |
  * | DS   | 2616 x 64263, 5347 M | 2616 x ~8000 (scaled)    |
  * | AB   | 1082 x 1093, ~1097 M | same sizes, ~1050 M      |
  * | AG   | 1363 x 3226, 1300 M  | same                     |
  */
object Datasets {

  val names: Seq[String] = Seq("FZ", "DA", "DS", "AB", "AG")

  private def schema(attrs: Seq[String]): StructType =
    StructType(StructField("id", LongType, nullable = false) +:
      attrs.map(a => StructField(a, StringType, nullable = true)))

  private def toDf(spark: SparkSession, rows: Seq[Row], attrs: Seq[String]): DataFrame =
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema(attrs))

  private def pairDf(spark: SparkSession, pairs: Seq[(Long, Long)]): DataFrame = {
    val sch = StructType(Seq(StructField("left_id", LongType, false),
                             StructField("right_id", LongType, false)))
    spark.createDataFrame(spark.sparkContext.parallelize(pairs.map(p => Row(p._1, p._2)), 4), sch)
  }

  /** Generic assembly: entity indices [0, nMatch) appear in both tables;
    * [nMatch, nMatch+nLeftExtra) only left; the rest only right. Matched
    * entities can have several right-side copies (`rightDups`), producing
    * both cross-table matches and right-table intra duplicates (DS).
    */
  private def assemble(spark: SparkSession, dsName: String, domain: Domain, seed: Long,
                       nMatch: Int, nLeftExtra: Int, nRightExtra: Int,
                       rightDups: Random => Int = _ => 1,
                       extraLeftRows: Seq[Seq[String]] = Nil,
                       specs: Seq[AttrSpec], blockAttr: String,
                       blockOverlap: Int, blockMaxDf: Long): ErDataset = {
    val nEnt = nMatch + nLeftExtra + nRightExtra
    val ents = domain.entities(seed, nEnt)
    val dupR = new Random(seed + 101)

    var leftId  = 100000L
    var rightId = 200000L
    val leftRows  = Seq.newBuilder[Row]
    val rightRows = Seq.newBuilder[Row]
    val truth     = Seq.newBuilder[(Long, Long)]
    val truthR    = Seq.newBuilder[(Long, Long)]

    for (i <- 0 until nMatch) {
      val lid = leftId; leftId += 1
      leftRows += Row.fromSeq(lid +: domain.leftView(seed, i, 0, ents(i)))
      val copies = rightDups(dupR)
      val rids = (0 until copies).map { c =>
        val rid = rightId; rightId += 1
        rightRows += Row.fromSeq(rid +: domain.rightView(seed, i, c, ents(i)))
        rid
      }
      rids.foreach(rid => truth += ((lid, rid)))
      for (a <- rids; b <- rids if a < b) truthR += ((a, b))
    }
    for (i <- nMatch until nMatch + nLeftExtra) {
      val lid = leftId; leftId += 1
      leftRows += Row.fromSeq(lid +: domain.leftView(seed, i, 0, ents(i)))
    }
    for (i <- nMatch + nLeftExtra until nEnt) {
      val copies = rightDups(dupR)
      val rids = (0 until copies).map { c =>
        val rid = rightId; rightId += 1
        rightRows += Row.fromSeq(rid +: domain.rightView(seed, i, c, ents(i)))
        rid
      }
      for (a <- rids; b <- rids if a < b) truthR += ((a, b))
    }
    extraLeftRows.foreach { vs =>
      val lid = leftId; leftId += 1
      leftRows += Row.fromSeq(lid +: vs)
    }

    ErDataset(dsName,
      toDf(spark, leftRows.result(), domain.attrs),
      toDf(spark, rightRows.result(), domain.attrs),
      pairDf(spark, truth.result()),
      pairDf(spark, truthR.result()),
      domain.attrs, specs, blockAttr, blockOverlap, blockMaxDf)
  }

  // ---------------- dataset configurations ----------------

  /** Fodors-Zagats: easy, 7 attributes, plus hotel-sibling records that
    * exercise transitivity (Example 1.3). `scale` shrinks it for unit tests.
    */
  def fz(spark: SparkSession, scale: Double = 1.0, seed: Long = 7): ErDataset = {
    val d        = Restaurants
    val nMatch   = math.max(8, (112 * scale).toInt)
    val nSibling = math.max(2, (15 * scale).toInt)
    val ents     = d.entities(seed, nMatch) // siblings attach to matched entities
    val siblings = (0 until nSibling).map(i => d.siblingLeftView(seed, i, ents(i)))
    val specs = Seq(
      AttrSpec("name", FeatureGen.stringSims),
      AttrSpec("addr", FeatureGen.stringSims),
      AttrSpec("city", FeatureGen.shortStringSims),
      AttrSpec("phone", FeatureGen.phoneSims),
      AttrSpec("type", FeatureGen.shortStringSims),
      AttrSpec("zipcode", FeatureGen.categoricalSims),
      AttrSpec("category", FeatureGen.shortStringSims),
    )
    assemble(spark, "FZ", d, seed,
      nMatch = nMatch,
      nLeftExtra  = math.max(4, (421 * scale).toInt) - nSibling,
      nRightExtra = math.max(4, (219 * scale).toInt),
      extraLeftRows = siblings,
      specs = specs, blockAttr = "name", blockOverlap = 4, blockMaxDf = 60)
  }

  private def citationSpecs = Seq(
    AttrSpec("title", FeatureGen.stringSims),
    AttrSpec("authors", FeatureGen.stringSims),
    AttrSpec("venue", FeatureGen.shortStringSims),
    AttrSpec("year", FeatureGen.numericSims),
  )

  /** DBLP-ACM: clean citations, near 1-1. */
  def da(spark: SparkSession, scale: Double = 1.0, seed: Long = 11): ErDataset =
    assemble(spark, "DA", new Citations(dirty = false), seed,
      nMatch = math.max(8, (2224 * scale).toInt),
      nLeftExtra  = math.max(4, (392 * scale).toInt),
      nRightExtra = math.max(4, (70 * scale).toInt),
      specs = citationSpecs, blockAttr = "title", blockOverlap = 4, blockMaxDf = 800)

  /** DBLP-Scholar: dirty right table WITH intra-table duplicates (the
    * paper's post-processing ablation collapses here, Table 5). Right side
    * scaled from 64k to ~8k tuples (see DESIGN.md).
    */
  def ds(spark: SparkSession, scale: Double = 1.0, seed: Long = 13): ErDataset =
    assemble(spark, "DS", new Citations(dirty = true), seed,
      nMatch = math.max(8, (2000 * scale).toInt),
      nLeftExtra  = math.max(4, (616 * scale).toInt),
      nRightExtra = math.max(4, (3600 * scale).toInt),
      rightDups = r => { val u = r.nextDouble(); if (u < 0.60) 1 else if (u < 0.90) 2 else 3 },
      specs = citationSpecs, blockAttr = "title", blockOverlap = 5, blockMaxDf = 800)

  /** Abt-Buy: products with long noisy names/descriptions, family near-miss
    * negatives, heavy missingness — hard for everyone (Table 3).
    */
  def ab(spark: SparkSession, scale: Double = 1.0, seed: Long = 17): ErDataset = {
    val specs = Seq(
      AttrSpec("name", FeatureGen.stringSims),
      AttrSpec("description", FeatureGen.textSims),
      AttrSpec("price", FeatureGen.numericSims),
    )
    assemble(spark, "AB", new Products(withManufacturer = false), seed,
      nMatch = math.max(8, (1050 * scale).toInt),
      nLeftExtra  = math.max(4, (32 * scale).toInt),
      nRightExtra = math.max(4, (43 * scale).toInt),
      specs = specs, blockAttr = "name", blockOverlap = 5, blockMaxDf = 300)
  }

  /** Amazon-Google products: manufacturer column, many right-only tuples. */
  def ag(spark: SparkSession, scale: Double = 1.0, seed: Long = 19): ErDataset = {
    val specs = Seq(
      AttrSpec("title", FeatureGen.stringSims),
      AttrSpec("manufacturer", FeatureGen.shortStringSims),
      AttrSpec("price", FeatureGen.numericSims),
    )
    assemble(spark, "AG", new Products(withManufacturer = true), seed,
      nMatch = math.max(8, (1300 * scale).toInt),
      nLeftExtra  = math.max(4, (63 * scale).toInt),
      nRightExtra = math.max(4, (1926 * scale).toInt),
      specs = specs, blockAttr = "title", blockOverlap = 5, blockMaxDf = 250)
  }

  def byName(spark: SparkSession, name: String, scale: Double = 1.0): ErDataset =
    name.toUpperCase match {
      case "FZ" => fz(spark, scale)
      case "DA" => da(spark, scale)
      case "DS" => ds(spark, scale)
      case "AB" => ab(spark, scale)
      case "AG" => ag(spark, scale)
      case other => throw new IllegalArgumentException(s"unknown dataset $other")
    }

  def all(spark: SparkSession, scale: Double = 1.0): Seq[ErDataset] =
    names.map(byName(spark, _, scale))
}
