package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import scala.util.Random

import repro.SparkSpec
import ZeroerModel._
import ZeroerEM._

class ZeroerEMSpec extends SparkSpec {

  private val cfg = Config(transMode = TransMode.Off)

  private def mkPrepared(nM: Int, nU: Int, d: Int, seed: Long = 3,
                         cM: Double = 0.85, cU: Double = 0.2): Prepared = {
    val r = new Random(seed)
    def vec(c: Double) = Array.fill(d)(math.min(1.0, math.max(0.0, c + r.nextGaussian() * 0.08)))
    val rows = (0 until nM).map(i => Row(i.toLong, 1000L + i, 2000L + i, vec(cM))) ++
               (0 until nU).map(i => Row((nM + i).toLong, 1500L + i, 2500L + i, vec(cU)))
    val sch = StructType(Seq(
      StructField("pair_id", LongType), StructField("left_id", LongType),
      StructField("right_id", LongType),
      StructField("features", ArrayType(DoubleType, containsNull = false))))
    val df = spark.createDataFrame(spark.sparkContext.parallelize(rows), sch).cache()
    val groups = Array.tabulate(d)(j => j / 2)
    Prepared("synth", df, d, groups, df.count(), sharedCorrelation(df, "features", groups))
  }

  test("sharedCorrelation has unit diagonal and masked cross-group entries") {
    val p = mkPrepared(50, 450, 4)
    assert(p.corr.length == 4)
    (0 until 4).foreach(i => assert(p.corr(i)(i) == 1.0))
    // features 0,1 in group 0; 2,3 in group 1 -> (0,2),(0,3),(1,2),(1,3) masked
    assert(p.corr(0)(2) == 0.0 && p.corr(1)(3) == 0.0)
  }

  test("sharedCorrelation is symmetric and within [-1, 1]") {
    val p = mkPrepared(50, 450, 6)
    for (i <- 0 until 6; j <- 0 until 6) {
      assert(math.abs(p.corr(i)(j) - p.corr(j)(i)) < 1e-9)
      assert(p.corr(i)(j) >= -1.0 - 1e-9 && p.corr(i)(j) <= 1.0 + 1e-9)
    }
  }

  test("init moments split by the epsilon threshold") {
    val p = mkPrepared(60, 440, 4)
    val m = moments(p, None, Map.empty, epsInit = 0.5)
    assert(math.abs(m.nM - 60.0) < 5.0, s"init nM=${m.nM}")
    assert(m.meanM.sum / 4 > 0.7)
    assert(m.meanU.sum / 4 < 0.35)
  }

  test("moments means/variances match a driver-side computation") {
    val p  = mkPrepared(30, 70, 3)
    val m  = moments(p, None, Map.empty, epsInit = 0.5)
    val xs = p.pairs.collect().map(r => r.getSeq[Double](3).toArray)
    val g  = xs.map(x => if (x.sum / x.length > 0.5) 1.0 else 0.0)
    val nM = g.sum
    for (j <- 0 until 3) {
      val mM = xs.zip(g).map { case (x, gi) => gi * x(j) }.sum / nM
      assert(math.abs(m.meanM(j) - mM) < 1e-9)
      val vM = xs.zip(g).map { case (x, gi) => gi * (x(j) - mM) * (x(j) - mM) }.sum / nM
      assert(math.abs(m.varM(j) - vM) < 1e-9)
    }
  }

  test("EM converges and recovers the mixture on separable data") {
    val p = mkPrepared(50, 950, 6)
    val res = Zeroer.fit(p, None, None, cfg)
    assert(res.converged, "EM should converge on clean data")
    assert(math.abs(res.params.piM - 0.05) < 0.01, s"piM=${res.params.piM}")
    assert(res.params.muM.sum / 6 > 0.7)
    assert(res.params.muU.sum / 6 < 0.3)
    val preds = res.predictions.count()
    assert(math.abs(preds - 50L) <= 3, s"predicted $preds of 50 matches")
  }

  test("EM is robust to a mis-set epsilon init (paper Fig 8b)") {
    for (eps <- Seq(0.3, 0.5, 0.7)) {
      val p = mkPrepared(50, 950, 6)
      val res = Zeroer.fit(p, None, None, cfg.copy(epsInit = eps))
      val n = res.predictions.count()
      assert(math.abs(n - 50L) <= 5, s"eps=$eps predicted $n")
    }
  }

  test("gamma overrides are honored by the next moment pass") {
    val p = mkPrepared(20, 180, 4)
    val params = build(moments(p, None, Map.empty, 0.5), p.corr, p.groups, cfg)
    // force pair 0 (a match-like vector) to gamma 0
    val m0 = moments(p, Some(params), Map.empty, 0.5)
    val m1 = moments(p, Some(params), Map(0L -> 0.0), 0.5)
    assert(m1.nM < m0.nM, "override to 0 must reduce the match mass")
  }

  test("eStep emits gamma, la, lb with gamma = sigmoid(la - lb)") {
    val p = mkPrepared(20, 80, 4)
    val params = build(moments(p, None, Map.empty, 0.5), p.corr, p.groups, cfg)
    eStep(p, params, Map.empty).collect().foreach { r =>
      val g = r.getDouble(3); val la = r.getDouble(4); val lb = r.getDouble(5)
      assert(math.abs(g - 1.0 / (1.0 + math.exp(lb - la))) < 1e-9)
    }
  }

  test("degenerate features (zero variance everywhere) do not crash EM") {
    // append a constant feature column to every vector
    val p0 = mkPrepared(30, 270, 4)
    import org.apache.spark.sql.functions._
    val addConst = udf((x: Seq[Double]) => (x :+ 0.0).toArray)
    val df = p0.pairs.withColumn("features", addConst(col("features"))).cache()
    val groups = p0.groups :+ 2
    val p = Prepared("degen", df, 5, groups, df.count(),
                     sharedCorrelation(df, "features", groups))
    val res = Zeroer.fit(p, None, None, cfg)
    assert(res.predictions.count() > 0)
  }

  test("overlapping mixtures yield calibrated (interior) posteriors") {
    val p = mkPrepared(100, 900, 4, cM = 0.6, cU = 0.4)
    val res = Zeroer.fit(p, None, None, cfg)
    import org.apache.spark.sql.functions._
    val interior = res.gammaDf.where(col("gamma") > 0.05 && col("gamma") < 0.95).count()
    assert(interior > 10, "overlapping clusters must produce uncertain posteriors")
  }
}
