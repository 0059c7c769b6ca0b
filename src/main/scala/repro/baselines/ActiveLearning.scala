package repro.baselines

import org.apache.spark.ml.classification.RandomForestClassifier
import org.apache.spark.ml.linalg.{Vector, Vectors}
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.eval.Metrics

/** AL-RF (paper baseline 10): uncertainty-sampling active learning over a
  * random forest, as in modAL. Starts from 10 random labels, repeatedly
  * queries the pool examples whose match probability is closest to 0.5,
  * and stops once it has labeled 50% of all matches or 50% of the pool
  * (§5.1). Queries are batched (modAL's default queries one example per
  * iteration; batching only changes wall-clock, not the sampling policy).
  */
object ActiveLearning {

  private val toVec = udf((a: Seq[Double]) => Vectors.dense(a.toArray))

  final case class AlResult(prf: Metrics.PRF, labelsUsed: Int,
                            history: Seq[(Int, Double)]) // (labels, F1 on pool)

  /** @param labeled candidate pairs with `features` and ground-truth `label`
    * @param batch   queries per iteration
    * @param maxRounds safety cap on AL iterations
    */
  def alrf(labeled: DataFrame, seed: Long = 42, batch: Int = 50,
           maxRounds: Int = 30, trees: Int = 50): AlResult = {
    val pool0 = labeled
      .select(col("pair_id"), col("left_id"), col("right_id"),
              toVec(col("features")).as("fvec"), col("label"))
      .cache()
    val n        = pool0.count()
    val nMatches = pool0.where(col("label") === 1.0).count()
    val stopAt   = math.min(nMatches / 2.0, n / 2.0)

    var labeledIds = pool0.orderBy(rand(seed)).limit(10)
      .select("pair_id").collect().map(_.getLong(0)).toSet
    var history  = Vector.empty[(Int, Double)]
    var lastPrf  = Metrics.PRF(0, 0, 0)
    var round    = 0
    var done     = false

    while (round < maxRounds && !done) {
      val train = pool0.where(col("pair_id").isin(labeledIds.toSeq: _*))
      val rest  = pool0.where(!col("pair_id").isin(labeledIds.toSeq: _*))
      val rf = new RandomForestClassifier().setNumTrees(trees).setMaxDepth(10)
        .setSeed(seed + round).setFeaturesCol("fvec").setLabelCol("label")
      val model = rf.fit(Supervised.oversample(train))
      val scored = model.transform(rest).cache()

      // a 10-example random seed set can be single-class -> probability
      // vector of length 1; treat that as "no match evidence yet"
      val pMatch = udf((v: Vector) => if (v.size > 1) v(1) else 0.0)
      lastPrf = Metrics.prf(
        scored.where(col("prediction") === 1.0).select("left_id", "right_id"),
        rest.where(col("label") === 1.0).select("left_id", "right_id"))
      history :+= ((labeledIds.size, lastPrf.f1))

      val labeledMatches = pool0
        .where(col("pair_id").isin(labeledIds.toSeq: _*) && col("label") === 1.0).count()
      if (labeledMatches >= stopAt || labeledIds.size >= n / 2.0) done = true
      else {
        // uncertainty sampling: probability closest to 0.5
        val queried = scored
          .withColumn("unc", abs(pMatch(col("probability")) - lit(0.5)))
          .orderBy(col("unc"))
          .limit(batch)
          .select("pair_id").collect().map(_.getLong(0))
        if (queried.isEmpty) done = true
        labeledIds ++= queried
      }
      scored.unpersist()
      round += 1
    }
    pool0.unpersist()
    AlResult(lastPrf, labeledIds.size, history)
  }
}
