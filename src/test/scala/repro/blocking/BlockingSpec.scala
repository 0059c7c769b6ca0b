package repro.blocking

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.SparkSpec
import repro.erdata.Datasets

class BlockingSpec extends SparkSpec {

  private def tbl(rows: (Long, String)*) = {
    val sch = StructType(Seq(StructField("id", LongType), StructField("name", StringType)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.map(r => Row(r._1, r._2))), sch)
  }

  test("pairs sharing a rare token become candidates") {
    val l = tbl(1L -> "zanzibar cafe", 2L -> "plain diner")
    val r = tbl(10L -> "zanzibar bistro", 11L -> "other place")
    val c = Blocking.candidatePairs(l, r, "id", "name", overlap = 3, maxDf = 100).collect()
    assert(c.exists(row => row.getLong(0) == 1L && row.getLong(1) == 10L))
  }

  test("pairs sharing no token are not candidates") {
    val l = tbl(1L -> "alpha beta")
    val r = tbl(10L -> "gamma delta")
    assert(Blocking.candidatePairs(l, r, "id", "name", 3, 100).count() == 0)
  }

  test("stop-word-like tokens above maxDf are not indexed") {
    val l = tbl((1L to 30L).map(i => i -> s"the shop$i"): _*)
    val r = tbl((101L to 130L).map(i => i -> s"the store${i - 100}"): _*)
    // "the" has df 60 > maxDf 50; each shopN/storeN is unique -> no shared keys
    assert(Blocking.candidatePairs(l, r, "id", "name", 3, 50).count() == 0)
  }

  test("overlap knob controls aggressiveness monotonically") {
    val ds   = Datasets.fz(spark, scale = 0.2)
    val tight = Blocking.candidatePairs(ds.left, ds.right, "id", "name", 1, 60).count()
    val loose = Blocking.candidatePairs(ds.left, ds.right, "id", "name", 5, 60).count()
    assert(loose >= tight)
  }

  test("candidates are a subset of the cross product with correct id spaces") {
    val ds = Datasets.fz(spark, scale = 0.2)
    val c  = Blocking.candidatePairs(ds.left, ds.right, "id", ds.blockAttr,
                                     ds.blockOverlap, ds.blockMaxDf)
    val leftIds  = ds.left.select("id").as[Long](org.apache.spark.sql.Encoders.scalaLong).collect().toSet
    val rightIds = ds.right.select("id").as[Long](org.apache.spark.sql.Encoders.scalaLong).collect().toSet
    c.collect().foreach { row =>
      assert(leftIds.contains(row.getLong(0)))
      assert(rightIds.contains(row.getLong(1)))
    }
  }

  test("candidate pairs are distinct") {
    val ds = Datasets.fz(spark, scale = 0.2)
    val c  = Blocking.candidatePairs(ds.left, ds.right, "id", ds.blockAttr,
                                     ds.blockOverlap, ds.blockMaxDf)
    assert(c.count() == c.distinct().count())
  }

  test("blocking recall on FZ stays high") {
    val ds = Datasets.fz(spark, scale = 0.5)
    val c  = Blocking.candidatePairs(ds.left, ds.right, "id", ds.blockAttr,
                                     ds.blockOverlap, ds.blockMaxDf)
    assert(Blocking.recall(spark, c, ds.truth) > 0.9)
  }

  test("selfCandidatePairs returns ordered within-table pairs") {
    val t = tbl(1L -> "zulu cafe", 2L -> "zulu diner", 3L -> "plain shop")
    val c = Blocking.selfCandidatePairs(t, "id", "name", 3, 100).collect()
    assert(c.forall(r => r.getLong(0) < r.getLong(1)))
    assert(c.exists(r => r.getLong(0) == 1L && r.getLong(1) == 2L))
  }

  test("selfCandidatePairs never pairs a record with itself") {
    val t = tbl(1L -> "alpha", 2L -> "alpha")
    val c = Blocking.selfCandidatePairs(t, "id", "name", 3, 100).collect()
    assert(c.forall(r => r.getLong(0) != r.getLong(1)))
  }

  test("withPairAttrs attaches both sides' attributes") {
    val l = tbl(1L -> "zanzibar cafe")
    val r = tbl(10L -> "zanzibar bistro")
    val p = Blocking.candidatePairs(l, r, "id", "name", 3, 100)
    val w = Blocking.withPairAttrs(p, l, r, "id", Seq("name")).head()
    assert(w.getAs[String]("l_name") == "zanzibar cafe")
    assert(w.getAs[String]("r_name") == "zanzibar bistro")
  }

  test("withPairId assigns unique ids") {
    val ds = Datasets.fz(spark, scale = 0.2)
    val c  = Blocking.withPairId(
      Blocking.candidatePairs(ds.left, ds.right, "id", ds.blockAttr, 4, 60))
    assert(c.select("pair_id").distinct().count() == c.count())
  }

  test("Oracle: candidate generation matches SQL token join") {
    val l = tbl(1L -> "zanzibar cafe", 2L -> "plain diner", 3L -> "odd zanzibar")
    val r = tbl(10L -> "zanzibar bistro", 11L -> "plain house", 12L -> "nothing")
    // with overlap >= record token count and no maxDf cut, blocking reduces
    // to: pairs sharing ANY token
    val got = Blocking.candidatePairs(l, r, "id", "name", overlap = 10, maxDf = 1000)
      .select(col("left_id"), col("right_id"))
    repro.Oracle.assertEquivalent(got,
      """SELECT DISTINCT l.id AS left_id, r.id AS right_id
        |FROM (SELECT id, unnest(string_split(name, ' ')) AS tok FROM lt) l
        |JOIN (SELECT id, unnest(string_split(name, ' ')) AS tok FROM rt) r
        |USING (tok)""".stripMargin,
      "lt" -> l, "rt" -> r)
  }
}
