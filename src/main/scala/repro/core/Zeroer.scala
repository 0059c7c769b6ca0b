package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

import repro.blocking.Blocking
import repro.erdata.ErDataset
import repro.sim.FeatureGen

import ZeroerModel._
import ZeroerEM._

/** The full ZeroER pipeline (Algorithms 1 and 2): blocking -> feature
  * generation -> shared-correlation estimation -> EM with adaptive
  * regularization and (optionally) transitivity constraints linking the
  * cross-, left- and right-table generative components.
  */
object Zeroer {

  final case class FitResult(
      predictions: DataFrame, // left_id, right_id, gamma (> 0.5)
      gammaDf: DataFrame,     // full posterior over the candidate set
      params: SideParams,     // cross-side parameters at convergence
      iters: Int,
      converged: Boolean,
      runtimeMs: Long,
  )

  /** Build a prepared cross-table side: blocked candidate pairs with
    * scaled features and the shared correlation matrix.
    */
  def prepareCross(ds: ErDataset): Prepared = {
    val cand = Blocking.candidatePairs(ds.left, ds.right, "id", ds.blockAttr,
                                       ds.blockOverlap, ds.blockMaxDf)
    prepare(s"${ds.name}-cross", Blocking.withPairAttrs(cand, ds.left, ds.right, "id", ds.attrs), ds)
  }

  /** Prepared within-table side (`which` = "left" | "right") for the
    * three-component model of §4.3.
    */
  def prepareSelf(ds: ErDataset, which: String): Prepared = {
    val tbl  = if (which == "left") ds.left else ds.right
    val cand = Blocking.selfCandidatePairs(tbl, "id", ds.blockAttr,
                                           ds.blockOverlap, ds.blockMaxDf)
    prepare(s"${ds.name}-$which", Blocking.withPairAttrs(cand, tbl, tbl, "id", ds.attrs), ds)
  }

  private def prepare(name: String, pairsWithAttrs: DataFrame, ds: ErDataset): Prepared = {
    val groups = FeatureGen.groupIndex(ds.specs)
    val d      = FeatureGen.numFeatures(ds.specs)
    val feats  = FeatureGen.imputeAndScale(FeatureGen.addFeatures(pairsWithAttrs, ds.specs))
    val pairs = Blocking.withPairId(feats)
      .select(col("pair_id"), col("left_id"), col("right_id"), col("features"))
      .persist(StorageLevel.MEMORY_AND_DISK)
    val n    = pairs.count()
    val corr = sharedCorrelation(pairs, "features", groups)
    Prepared(name, pairs, d, groups, n, corr)
  }

  /** Fit the generative model. With `TransMode.Constraint` the left/right
    * sides must be provided (Algorithm 2); otherwise only the cross side
    * is used (Algorithm 1).
    */
  def fit(cross: Prepared, leftSide: Option[Prepared], rightSide: Option[Prepared],
          cfg: Config): FitResult = {
    val t0 = System.nanoTime()
    val sides: Seq[Prepared] =
      if (cfg.transMode == TransMode.Constraint)
        Seq(Some(cross), leftSide, rightSide).flatten
      else Seq(cross)

    // Initialization M-step from the thresholded γ (Algorithm 1 lines 4, 8-12).
    var params: Map[String, SideParams] = sides.map { s =>
      s.name -> build(moments(s, None, Map.empty, cfg.epsInit), s.corr, s.groups, cfg)
    }.toMap
    var overrides  = Transitivity.Overrides.empty
    var prevLL     = Double.NegativeInfinity
    var iter       = 0
    var converged  = false

    def ovFor(s: Prepared): Map[Long, Double] =
      if (s eq cross) overrides.cross
      else if (leftSide.exists(_ eq s)) overrides.left
      else overrides.right

    while (iter < cfg.maxIter && !converged) {
      // E-step + transitivity resolution (Algorithm 2 lines 5-7).
      // Id-set filters go through a broadcast-set UDF: an `isin` over
      // thousands of ids compiles into a megabyte In-expression per task.
      if (cfg.transMode == TransMode.Constraint && leftSide.isDefined && rightSide.isDefined) {
        def inSet(ids: Set[Long]) = udf((x: Long) => ids.contains(x))
        val crossE = eStep(cross, params(cross.name), Map.empty)
        val crossM = collectRows(crossE.where(col("gamma") >= 0.5))
        // A degenerate intermediate model can flood Q' with the whole
        // candidate set; constraints would be meaningless and quadratic.
        if (crossM.size <= math.max(1000, 20 * math.sqrt(cross.n.toDouble).toLong)) {
          val mLeft  = crossM.map(_.leftId).toSet
          val mRight = crossM.map(_.rightId).toSet
          def within(s: Prepared, ids: Set[Long]): Seq[GammaRow] =
            if (ids.isEmpty) Nil
            else collectRows(
              eStep(s, params(s.name), Map.empty)
                .where(inSet(ids)(col("left_id")) && inSet(ids)(col("right_id"))))
          val wl = within(leftSide.get, mLeft)
          val wr = within(rightSide.get, mRight)
          overrides = Transitivity.resolve(crossM, wl, wr)
        } else overrides = Transitivity.Overrides.empty
      }

      // M-step over the (possibly constraint-adjusted) posteriors
      val moms = sides.map(s => s -> moments(s, Some(params(s.name)), ovFor(s), cfg.epsInit))
      val ll   = moms.map(_._2.loglik).sum
      params   = moms.map { case (s, m) => s.name -> build(m, s.corr, s.groups, cfg) }.toMap

      converged = math.abs(ll - prevLL) <= cfg.tol * (1.0 + math.abs(ll))
      prevLL = ll
      iter += 1
    }

    // Final posteriors and predictions.
    val gammaDf = eStep(cross, params(cross.name),
                        if (cfg.transMode == TransMode.Constraint) overrides.cross else Map.empty)
      .persist(StorageLevel.MEMORY_AND_DISK)
    gammaDf.count() // materialize before the caller unpersists the inputs
    val preds = cfg.transMode match {
      case TransMode.PostProcess =>
        val kept = Transitivity.postProcess(collectRows(gammaDf.where(col("gamma") > 0.5)))
        val spark = gammaDf.sparkSession
        import spark.implicits._
        kept.map(r => (r.leftId, r.rightId, r.gamma)).toDF("left_id", "right_id", "gamma")
      case _ =>
        gammaDf.where(col("gamma") > 0.5).select("left_id", "right_id", "gamma")
    }
    FitResult(preds, gammaDf, params(cross.name), iter, converged,
              (System.nanoTime() - t0) / 1000000L)
  }

  /** End-to-end: blocking + features + fit on a benchmark dataset. */
  def run(spark: SparkSession, ds: ErDataset,
          cfg: Config = Config()): FitResult = {
    val cross = prepareCross(ds)
    val (l, r) =
      if (cfg.transMode == TransMode.Constraint)
        (Some(prepareSelf(ds, "left")), Some(prepareSelf(ds, "right")))
      else (None, None)
    try fit(cross, l, r, cfg)
    finally {
      cross.pairs.unpersist()
      l.foreach(_.pairs.unpersist()); r.foreach(_.pairs.unpersist())
    }
  }
}
