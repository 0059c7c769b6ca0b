package repro.erdata

import org.apache.spark.sql.functions._
import scala.util.Random

import repro.SparkSpec

class ErDataSpec extends SparkSpec {

  test("Perturb.typos is deterministic in the Random seed") {
    val a = Perturb.typos(new Random(7), "golden dragon cafe", 0.2)
    val b = Perturb.typos(new Random(7), "golden dragon cafe", 0.2)
    assert(a == b)
  }
  test("Perturb.typos with rate 0 is identity") {
    assert(Perturb.typos(new Random(1), "hello world", 0.0) == "hello world")
  }
  test("Perturb.dropTokens keeps at least keepMin tokens") {
    val out = Perturb.dropTokens(new Random(3), "a b c d e", 0.99, keepMin = 2)
    assert(out.split(" ").length >= 2)
  }
  test("Perturb.abbrevTokens abbreviates to initial+dot") {
    val out = Perturb.abbrevTokens(new Random(5), "golden dragon", 1.0)
    assert(out == "g. d.")
  }
  test("Perturb.truncateTokens keeps the prefix") {
    assert(Perturb.truncateTokens("a b c d", 2) == "a b")
  }
  test("Perturb.maybeNull honors the probability extremes") {
    assert(Perturb.maybeNull(new Random(1), "x", 0.0) == "x")
    assert(Perturb.maybeNull(new Random(1), "x", 1.0) == null)
  }
  test("Perturb.jitterNumber stays within the window") {
    val v = Perturb.jitterNumber(new Random(2), "100.0", 0.1).toDouble
    assert(v >= 90.0 && v <= 110.0)
  }
  test("Perturb.jitterNumber passes through non-numbers") {
    assert(Perturb.jitterNumber(new Random(2), "n/a", 0.1) == "n/a")
  }

  test("dataset generation is deterministic") {
    val a = Datasets.fz(spark, scale = 0.2)
    val b = Datasets.fz(spark, scale = 0.2)
    assert(a.left.collect().toSeq == b.left.collect().toSeq)
    assert(a.truth.collect().toSeq == b.truth.collect().toSeq)
  }

  test("FZ sizes follow the Table 2 shape at full scale") {
    val ds = Datasets.fz(spark)
    assert(ds.nLeft == 533, s"left=${ds.nLeft}")
    assert(ds.nRight == 331, s"right=${ds.nRight}")
    assert(ds.nMatch == 112, s"matches=${ds.nMatch}")
  }

  test("DA sizes follow the Table 2 shape at full scale") {
    val ds = Datasets.da(spark)
    assert(ds.nLeft == 2616)
    assert(ds.nRight == 2294)
    assert(ds.nMatch == 2224)
  }

  test("AG sizes follow the Table 2 shape at full scale") {
    val ds = Datasets.ag(spark)
    assert(ds.nLeft == 1363)
    assert(ds.nRight == 3226)
    assert(ds.nMatch == 1300)
  }

  test("DS right table carries intra-table duplicates") {
    val ds = Datasets.ds(spark, scale = 0.2)
    assert(ds.truthRight.count() > 0, "DS must have right-table duplicates (Table 5 ablation)")
    // one left tuple can match several right duplicates
    val maxFan = ds.truth.groupBy("left_id").count().agg(max("count")).head().getLong(0)
    assert(maxFan >= 2)
  }

  test("FZ and DA are duplicate-free within tables") {
    assert(Datasets.fz(spark, 0.3).truthRight.count() == 0)
    assert(Datasets.da(spark, 0.3).truthRight.count() == 0)
  }

  test("truth pairs reference existing tuples") {
    val ds = Datasets.ab(spark, scale = 0.2)
    val orphan = ds.truth
      .join(ds.left.select(col("id").as("left_id")), Seq("left_id"), "left_anti")
    assert(orphan.count() == 0)
    val orphanR = ds.truth
      .join(ds.right.select(col("id").as("right_id")), Seq("right_id"), "left_anti")
    assert(orphanR.count() == 0)
  }

  test("left and right render the same entity differently (format divergence)") {
    val ds = Datasets.fz(spark, scale = 0.3)
    val joined = ds.truth
      .join(ds.left.select(col("id").as("left_id"), col("phone").as("lp")), "left_id")
      .join(ds.right.select(col("id").as("right_id"), col("phone").as("rp")), "right_id")
    // fodors uses 404/237-2700, zagats 404-237-2700: raw equality must fail
    val sameFormat = joined.where(col("lp") === col("rp")).count()
    assert(sameFormat == 0, "phone formats must diverge between tables")
    // but the digits agree for true matches
    val digitsDiffer = joined
      .where(regexp_replace(col("lp"), "[^0-9]", "") =!= regexp_replace(col("rp"), "[^0-9]", ""))
      .count()
    assert(digitsDiffer == 0)
  }

  test("restaurant names are unique within the entity pool (FZ is the easy dataset)") {
    val ds  = Datasets.fz(spark)
    val n   = ds.left.select("name").count()
    // sibling records prepend a prefix, so names remain distinct
    assert(ds.left.select("name").distinct().count() == n)
  }

  test("products come in families producing near-miss negatives") {
    val ds = Datasets.ab(spark, scale = 0.3)
    // name similarity between distinct right tuples sharing brand+line is high:
    // verify at least some pairs of distinct right products share 2+ name tokens
    val toks = ds.right.select(col("id"),
      split(col("name"), " ").as("t"))
    val shared = toks.as("a").join(toks.as("b"),
        col("a.id") < col("b.id") &&
        size(array_intersect(col("a.t"), col("b.t"))) >= 2)
      .count()
    assert(shared > 50, s"expected family near-misses, got $shared")
  }

  test("AB descriptions and prices have missing values") {
    val ds = Datasets.ab(spark, scale = 0.3)
    assert(ds.right.where(col("description").isNull).count() > 0)
    assert(ds.left.where(col("price").isNull).count() > 0)
  }

  test("DS dirty side has missing venues and years") {
    val ds = Datasets.ds(spark, scale = 0.2)
    assert(ds.right.where(col("venue").isNull).count() > 0)
    assert(ds.right.where(col("year").isNull).count() > 0)
    // DBLP side is clean
    assert(ds.left.where(col("venue").isNull).count() == 0)
  }

  test("byName resolves every dataset and rejects unknown names") {
    Datasets.names.foreach { n =>
      assert(Datasets.byName(spark, n, 0.1).name == n)
    }
    intercept[IllegalArgumentException](Datasets.byName(spark, "nope"))
  }

  test("scale parameter shrinks all tables proportionally") {
    val full = Datasets.da(spark, 1.0)
    val tiny = Datasets.da(spark, 0.1)
    assert(tiny.nLeft < full.nLeft / 5)
    assert(tiny.nMatch < full.nMatch / 5)
  }

  test("Oracle: match count via SQL join over generated tables") {
    val ds  = Datasets.fz(spark, scale = 0.2)
    val got = ds.truth.groupBy().agg(count(lit(1)).as("n"))
    repro.Oracle.assertEquivalent(got,
      "SELECT count(*) AS n FROM truth", "truth" -> ds.truth)
  }
}
