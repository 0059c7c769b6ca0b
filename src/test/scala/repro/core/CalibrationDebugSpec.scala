package repro.core

import repro.SparkSpec
import repro.baselines.Unsupervised
import repro.blocking.Blocking
import repro.erdata.Datasets
import repro.eval.Metrics
import repro.core.ZeroerModel._

/** Cross-dataset integration sweep at reduced scale: asserts the Table 3
  * *shape* — ZeroER does well everywhere, clustering baselines collapse on
  * the hard product datasets — without pinning fragile absolute numbers.
  */
class CalibrationDebugSpec extends SparkSpec {

  private val zeroerFloor = Map(
    "FZ" -> 0.85, "DA" -> 0.90, "DS" -> 0.70, "AB" -> 0.55, "AG" -> 0.50)

  test("calibration sweep at scale 0.3") {
    val results = for (name <- Datasets.names) yield {
      val ds    = Datasets.byName(spark, name, scale = 0.3)
      val cross = Zeroer.prepareCross(ds)
      val truth = ds.truth.cache()
      val rec   = Blocking.recall(spark, cross.pairs, truth)
      val z     = Zeroer.fit(cross, None, None, Config(transMode = TransMode.Off, maxIter = 40))
      val zPrf  = Metrics.prf(z.predictions, truth)
      val kmrl  = Metrics.prf(Unsupervised.kmRl(cross.pairs), truth)
      val gmm   = Metrics.prf(Unsupervised.gmm(cross.pairs), truth)
      info(f"$name: cands=${cross.n} truth=${truth.count()} blockRecall=$rec%.3f " +
        f"zeroer=${zPrf.f1}%.3f (P=${zPrf.precision}%.2f R=${zPrf.recall}%.2f it=${z.iters}) " +
        f"kmrl=${kmrl.f1}%.3f gmm=${gmm.f1}%.3f")
      cross.pairs.unpersist(); truth.unpersist()
      assert(rec > 0.8, s"$name blocking recall $rec")
      assert(zPrf.f1 >= zeroerFloor(name), s"$name zeroer F1 ${zPrf.f1}")
      (name, zPrf.f1, kmrl.f1, gmm.f1)
    }
    val avgZ   = results.map(_._2).sum / results.size
    val avgKm  = results.map(_._3).sum / results.size
    val avgGmm = results.map(_._4).sum / results.size
    info(f"averages: zeroer=$avgZ%.3f kmrl=$avgKm%.3f gmm=$avgGmm%.3f")
    assert(avgZ > avgKm, "ZeroER must beat KM-RL on average (Table 3)")
    assert(avgZ > avgGmm, "ZeroER must beat naive GMM on average (Table 3)")
    // the hard product datasets are where clustering collapses
    assert(results.find(_._1 == "AB").get._3 < 0.5, "KM-RL collapses on AB")
    assert(results.find(_._1 == "AG").get._4 < 0.3, "GMM collapses on AG")
  }
}
