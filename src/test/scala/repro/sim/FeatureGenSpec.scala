package repro.sim

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.SparkSpec

class FeatureGenSpec extends SparkSpec {

  private val specs = Seq(
    AttrSpec("name", FeatureGen.stringSims),
    AttrSpec("year", FeatureGen.numericSims),
  )

  private def mkPairs(rows: Seq[(Long, Long, String, String, String, String)]) = {
    val sch = StructType(Seq(
      StructField("left_id", LongType), StructField("right_id", LongType),
      StructField("l_name", StringType), StructField("r_name", StringType),
      StructField("l_year", StringType), StructField("r_year", StringType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row(r._1, r._2, r._3, r._4, r._5, r._6))), sch)
  }

  test("featureNames enumerate attr x sim in order") {
    val names = FeatureGen.featureNames(specs)
    assert(names.size == 9)
    assert(names.head == "name_lev_sim")
    assert(names.last == "year_exm")
  }

  test("groupIndex assigns one group per attribute") {
    assert(FeatureGen.groupIndex(specs).toSeq == Seq(0, 0, 0, 0, 0, 0, 0, 1, 1))
  }

  test("numFeatures sums sim counts") {
    assert(FeatureGen.numFeatures(specs) == 9)
  }

  test("addFeatures computes a full vector per pair") {
    val df = FeatureGen.addFeatures(
      mkPairs(Seq((1L, 2L, "golden dragon", "golden dragon", "1999", "1999"))), specs)
    val feats = df.select("features").head().getSeq[Double](0)
    assert(feats.size == 9)
    assert(feats.forall(_ == 1.0), s"identical pair must be all-1: $feats")
  }

  test("addFeatures on a dissimilar pair gives low name sims") {
    val df = FeatureGen.addFeatures(
      mkPairs(Seq((1L, 2L, "golden dragon", "tiny owl", "1999", "2005"))), specs)
    val feats = df.select("features").head().getSeq[Double](0)
    assert(feats(6) == 0.0) // name exact
    assert(feats(2) < 0.2)  // jaccard qgram
  }

  test("NULL attribute values produce NaN features for that group") {
    val df = FeatureGen.addFeatures(
      mkPairs(Seq((1L, 2L, null, "golden dragon", "1999", "1999"))), specs)
    val feats = df.select("features").head().getSeq[Double](0)
    assert(feats.take(7).forall(_.isNaN))
    assert(feats(7) == 1.0) // year unaffected
  }

  test("imputeAndScale replaces NaN with the feature mean") {
    val pairs = mkPairs(Seq(
      (1L, 2L, "aa", "aa", "2000", "2000"),
      (2L, 3L, null, "bb", "2000", "2001"),
      (3L, 4L, "aa", "ab", "2000", "2002")))
    val scaled = FeatureGen.imputeAndScale(FeatureGen.addFeatures(pairs, specs))
    val all = scaled.select("features").collect().map(_.getSeq[Double](0))
    assert(all.flatten.forall(v => !v.isNaN))
  }

  test("imputeAndScale maps every feature into [0,1]") {
    val pairs = mkPairs(Seq(
      (1L, 2L, "golden dragon", "golden dragon", "1999", "1999"),
      (2L, 3L, "golden dragon", "tiny owl", "1999", "2010"),
      (3L, 4L, "blue palace", "blue place", "2001", "2002")))
    val scaled = FeatureGen.imputeAndScale(FeatureGen.addFeatures(pairs, specs))
    val all = scaled.select("features").collect().flatMap(_.getSeq[Double](0))
    assert(all.forall(v => v >= 0.0 && v <= 1.0))
  }

  test("imputeAndScale sends a constant feature to 0") {
    val pairs = mkPairs(Seq(
      (1L, 2L, "x", "y", "2000", "2000"),
      (2L, 3L, "z", "w", "2000", "2000")))
    val scaled = FeatureGen.imputeAndScale(FeatureGen.addFeatures(pairs, specs))
    // year_exm is 1.0 everywhere -> constant -> scaled to 0
    val idx = FeatureGen.featureNames(specs).indexOf("year_exm")
    scaled.select("features").collect().foreach { r =>
      assert(r.getSeq[Double](0)(idx) == 0.0)
    }
  }

  test("min-max scaling preserves feature ordering") {
    val pairs = mkPairs(Seq(
      (1L, 2L, "golden dragon", "golden dragon", "1999", "1999"),
      (2L, 3L, "golden dragon", "golden dragons", "1999", "1999"),
      (3L, 4L, "golden dragon", "owl", "1999", "1999")))
    val scaled = FeatureGen.imputeAndScale(FeatureGen.addFeatures(pairs, specs))
      .orderBy("left_id")
    val lev = scaled.select("features").collect().map(_.getSeq[Double](0)(0))
    assert(lev(0) >= lev(1) && lev(1) >= lev(2))
  }

  test("Oracle: pair count survives the featurization pipeline") {
    val pairs = mkPairs(Seq(
      (1L, 2L, "a b", "a b", "1", "1"),
      (2L, 3L, "c d", "c e", "2", "2"),
      (3L, 4L, "f", "g", "3", "4")))
    val out = FeatureGen.addFeatures(pairs, specs)
      .groupBy()
      .agg(count(lit(1)).as("n"))
    repro.Oracle.assertEquivalent(out, "SELECT count(*) AS n FROM pairs",
      "pairs" -> pairs.select("left_id", "right_id"))
  }
}
