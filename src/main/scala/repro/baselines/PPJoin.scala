package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** PPJoin baseline (paper baseline 9, Xiao et al. TODS'11): a set-similarity
  * join with prefix filtering over the *concatenation of all attributes*
  * (PPJoin is single-attribute). Jaccard and Cosine are supported — the two
  * similarity functions the PPJoin paper optimizes — and PP* sweeps the
  * threshold grid {0.2, 0.4, 0.6, 0.8, 1.0} x {jaccard, cosine} and reports
  * the best F1 (only reachable with ground truth, as the paper notes).
  *
  * Prefix filtering: with tokens canonically ordered by ascending global
  * frequency, a record of size s needs only its first
  * `s - ceil(t*s) + 1` (Jaccard) or `s - ceil(t²*s) + 1` (Cosine) tokens
  * indexed — any qualifying partner must share one of them. Verification
  * computes the exact similarity, so the filter only needs completeness
  * (asserted against brute force in the tests).
  */
object PPJoin {

  /** Records as (id, tokens sorted by global-frequency rank). */
  private def tokenized(df: DataFrame, idCol: String, attrs: Seq[String],
                        rank: DataFrame): DataFrame =
    df.select(col(idCol).as("rid"),
        explode(array_distinct(filter(
          split(lower(concat_ws(" ", attrs.map(a => coalesce(col(a), lit(""))): _*)),
                "[^a-z0-9]+"), t => length(t) > 0))).as("tok"))
      .join(rank, "tok")
      .groupBy("rid")
      .agg(array_sort(collect_list(struct(col("r"), col("tok")))).as("st"))
      .select(col("rid"), col("st.tok").as("toks"), size(col("st")).as("sz"))

  /** Global token ranking (ascending document frequency, ties by token). */
  private def tokenRank(left: DataFrame, right: DataFrame, idCol: String,
                        attrs: Seq[String]): DataFrame = {
    def toks(df: DataFrame) =
      df.select(explode(array_distinct(filter(
        split(lower(concat_ws(" ", attrs.map(a => coalesce(col(a), lit(""))): _*)),
              "[^a-z0-9]+"), t => length(t) > 0))).as("tok"))
    toks(left).unionByName(toks(right))
      .groupBy("tok").agg(count(lit(1)).as("df"))
      .select(col("tok"),
              row_number().over(org.apache.spark.sql.expressions.Window
                .orderBy(col("df"), col("tok"))).as("r"))
  }

  /** Similarity join: pairs with sim(tokens_l, tokens_r) >= threshold. */
  def join(left: DataFrame, right: DataFrame, idCol: String, attrs: Seq[String],
           sim: String, threshold: Double): DataFrame = {
    require(sim == "jaccard" || sim == "cosine", s"unsupported sim $sim")
    val rank = tokenRank(left, right, idCol, attrs)
    val l    = tokenized(left, idCol, attrs, rank)
    val r    = tokenized(right, idCol, attrs, rank)

    val prefixLen: org.apache.spark.sql.Column =
      if (sim == "jaccard") col("sz") - ceil(lit(threshold) * col("sz")) + 1
      else col("sz") - ceil(lit(threshold * threshold) * col("sz")) + 1

    def prefixes(t: DataFrame) =
      t.select(col("rid"), col("sz"),
               explode(slice(col("toks"), lit(1), greatest(prefixLen, lit(1)).cast("int"))).as("tok"))

    // length filter: |y| in [t|x|, |x|/t] (jaccard) or [t²|x|, |x|/t²] (cosine)
    val lenOk =
      if (sim == "jaccard")
        col("r_sz") >= lit(threshold) * col("l_sz") &&
          col("l_sz") >= lit(threshold) * col("r_sz")
      else
        col("r_sz") >= lit(threshold * threshold) * col("l_sz") &&
          col("l_sz") >= lit(threshold * threshold) * col("r_sz")

    val cand = prefixes(l).withColumnRenamed("rid", "left_id").withColumnRenamed("sz", "l_sz")
      .join(prefixes(r).withColumnRenamed("rid", "right_id").withColumnRenamed("sz", "r_sz"), "tok")
      .where(lenOk)
      .select("left_id", "right_id").distinct()

    val verify = cand
      .join(l.select(col("rid").as("left_id"), col("toks").as("l_toks")), "left_id")
      .join(r.select(col("rid").as("right_id"), col("toks").as("r_toks")), "right_id")
      .withColumn("inter", size(array_intersect(col("l_toks"), col("r_toks"))).cast("double"))
      .withColumn("sim",
        if (sim == "jaccard")
          col("inter") / (size(col("l_toks")) + size(col("r_toks")) - col("inter"))
        else
          col("inter") / sqrt(size(col("l_toks")).cast("double") * size(col("r_toks"))))
    verify.where(col("sim") >= threshold).select("left_id", "right_id", "sim")
  }

  final case class Best(sim: String, threshold: Double, f1: Double,
                        precision: Double, recall: Double)

  /** PP*: best configuration over the sweep, chosen with ground truth. */
  def best(left: DataFrame, right: DataFrame, idCol: String, attrs: Seq[String],
           truth: DataFrame): Best = {
    val configs = for {
      s <- Seq("jaccard", "cosine")
      t <- Seq(0.2, 0.4, 0.6, 0.8, 1.0)
    } yield (s, t)
    configs.map { case (s, t) =>
      val prf = repro.eval.Metrics.prf(join(left, right, idCol, attrs, s, t), truth)
      Best(s, t, prf.f1, prf.precision, prf.recall)
    }.maxBy(_.f1)
  }
}
