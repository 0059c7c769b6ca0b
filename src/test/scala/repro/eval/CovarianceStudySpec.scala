package repro.eval

import repro.SparkSpec
import repro.core.Zeroer
import repro.erdata.Datasets
import repro.sim.FeatureGen

class CovarianceStudySpec extends SparkSpec {

  private lazy val (labeled, groups) = {
    val ds    = Datasets.fz(spark, scale = 0.4)
    val cross = Zeroer.prepareCross(ds)
    (Metrics.withLabel(cross.pairs, ds.truth).cache(), FeatureGen.groupIndex(ds.specs))
  }

  test("Table 1 row: correlation cosine exceeds covariance cosine") {
    val row = CovarianceStudy.table1Row("FZ", labeled, groups)
    info(s"Table1 FZ/0.4: cos(S_M,S_U)=${row.cosCov} cos(R_M,R_U)=${row.cosCorr}")
    assert(row.cosCorr > row.cosCov,
      s"correlation sharing premise: ${row.cosCorr} vs ${row.cosCov}")
  }

  test("correlation cosine is high (the paper's sharing justification)") {
    val row = CovarianceStudy.table1Row("FZ", labeled, groups)
    assert(row.cosCorr > 0.8, s"cos(R_M,R_U)=${row.cosCorr}")
  }

  test("cosines are in [-1, 1]") {
    val row = CovarianceStudy.table1Row("FZ", labeled, groups)
    assert(row.cosCov >= -1.0 && row.cosCov <= 1.0 + 1e-9)
    assert(row.cosCorr >= -1.0 && row.cosCorr <= 1.0 + 1e-9)
  }
}
