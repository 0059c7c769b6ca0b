package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.LinAlg

/** Table 1 reproduction: using ground truth, compare the sample covariance
  * matrices of matches vs unmatches (`cosine(S_M, S_U)`) and their Pearson
  * correlation matrices (`cosine(R_M, R_U)`) after feature grouping — the
  * empirical justification for correlation sharing (§3.1).
  */
object CovarianceStudy {

  final case class Table1Row(dataset: String, cosCov: Double, cosCorr: Double)

  /** Per-class sample covariance via a distributed moment aggregation over
    * the labeled candidate-pair features.
    */
  private def classCovariance(labeled: DataFrame, matchClass: Boolean,
                              d: Int): Array[Array[Double]] = {
    val sel = labeled.where(col("label") === (if (matchClass) 1.0 else 0.0))
    val (n, sums, prods) = sel
      .select(col("features"))
      .rdd
      .map(r => r.getSeq[Double](0).toArray)
      .treeAggregate((0L, new Array[Double](d), Array.ofDim[Double](d, d)))(
        seqOp = { case ((n, s, p), x) =>
          var i = 0
          while (i < d) {
            s(i) += x(i)
            var j = 0
            while (j <= i) { p(i)(j) += x(i) * x(j); j += 1 }
            i += 1
          }
          (n + 1, s, p)
        },
        combOp = { case ((n1, s1, p1), (n2, s2, p2)) =>
          var i = 0
          while (i < d) {
            s1(i) += s2(i)
            var j = 0
            while (j <= i) { p1(i)(j) += p2(i)(j); j += 1 }
            i += 1
          }
          (n1 + n2, s1, p1)
        })
    val cov = Array.ofDim[Double](d, d)
    if (n > 1) {
      var i = 0
      while (i < d) {
        var j = 0
        while (j <= i) {
          val c = prods(i)(j) / n - (sums(i) / n) * (sums(j) / n)
          cov(i)(j) = c; cov(j)(i) = c
          j += 1
        }
        i += 1
      }
    }
    cov
  }

  private def toCorrelation(cov: Array[Array[Double]]): Array[Array[Double]] = {
    val d  = cov.length
    val sd = Array.tabulate(d)(i => math.sqrt(math.max(cov(i)(i), 0.0)))
    Array.tabulate(d, d) { (i, j) =>
      if (i == j) 1.0
      else if (sd(i) <= 1e-12 || sd(j) <= 1e-12) 0.0
      else cov(i)(j) / (sd(i) * sd(j))
    }
  }

  private def maskToGroups(m: Array[Array[Double]], groups: Array[Int]): Array[Array[Double]] =
    Array.tabulate(m.length, m.length)((i, j) =>
      if (groups(i) == groups(j)) m(i)(j) else 0.0)

  /** @param labeled candidate pairs with `features` and ground-truth `label`
    * @param groups  feature -> attribute-group index (Figure 4(b) blocks)
    */
  def table1Row(name: String, labeled: DataFrame, groups: Array[Int]): Table1Row = {
    val d    = groups.length
    val sM   = maskToGroups(classCovariance(labeled, matchClass = true, d), groups)
    val sU   = maskToGroups(classCovariance(labeled, matchClass = false, d), groups)
    val rM   = maskToGroups(toCorrelation(sM), groups)
    val rU   = maskToGroups(toCorrelation(sU), groups)
    Table1Row(name, LinAlg.cosineFlat(sM, sU), LinAlg.cosineFlat(rM, rU))
  }
}
