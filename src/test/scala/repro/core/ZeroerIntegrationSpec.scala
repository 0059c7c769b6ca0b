package repro.core

import repro.SparkSpec
import repro.erdata.Datasets
import repro.eval.Metrics
import repro.core.ZeroerModel._

/** End-to-end ZeroER on small benchmark datasets (subset scales keep the
  * suite fast; the full scales run in bench/).
  */
class ZeroerIntegrationSpec extends SparkSpec {

  lazy val fzHalf = Datasets.fz(spark, scale = 0.5)

  test("ZeroER (no transitivity) reaches high F1 on FZ at half scale") {
    val res = Zeroer.run(spark, fzHalf,
      Config(transMode = TransMode.Off, maxIter = 40))
    val prf = Metrics.prf(res.predictions, fzHalf.truth)
    info(s"FZ/2 no-trans: P=${prf.precision} R=${prf.recall} F1=${prf.f1} iters=${res.iters}")
    assert(prf.f1 > 0.85, s"expected F1 > 0.85, got ${prf.f1}")
  }

  test("ZeroER with transitivity constraints does not hurt FZ") {
    val res = Zeroer.run(spark, fzHalf,
      Config(transMode = TransMode.Constraint, maxIter = 40))
    val prf = Metrics.prf(res.predictions, fzHalf.truth)
    info(s"FZ/2 trans: P=${prf.precision} R=${prf.recall} F1=${prf.f1} iters=${res.iters}")
    assert(prf.f1 > 0.85, s"expected F1 > 0.85, got ${prf.f1}")
  }

  test("ZeroER outperforms its no-grouping/no-adaptive-reg ablation on FZ") {
    val full = Zeroer.run(spark, fzHalf,
      Config(transMode = TransMode.Off, maxIter = 40))
    val abl = Zeroer.run(spark, fzHalf,
      Config(covMode = CovMode.DiagShared, regMode = RegMode.Uniform(1e-6),
             transMode = TransMode.Off, maxIter = 40))
    val f1Full = Metrics.prf(full.predictions, fzHalf.truth).f1
    val f1Abl  = Metrics.prf(abl.predictions, fzHalf.truth).f1
    info(s"FZ/2 full=$f1Full ablated=$f1Abl")
    assert(f1Full >= f1Abl - 0.05, s"full $f1Full should not lose to ablation $f1Abl")
  }

  test("posterior gamma is a probability for every candidate pair") {
    val res = Zeroer.run(spark, fzHalf, Config(transMode = TransMode.Off, maxIter = 10))
    import org.apache.spark.sql.functions._
    val bad = res.gammaDf.where(col("gamma") < 0 || col("gamma") > 1 || isnan(col("gamma"))).count()
    assert(bad == 0)
  }
}
