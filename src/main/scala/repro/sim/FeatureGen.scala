package repro.sim

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** A named similarity function, e.g. `name_name_lev_sim`. */
final case class SimFn(name: String, f: (String, String) => Double)

/** All similarity functions applied to one aligned attribute — the paper's
  * *feature group* (§3.1): features inside one group share a covariance
  * block; features across groups are independent.
  */
final case class AttrSpec(attr: String, sims: Seq[SimFn])

/** Magellan-style feature generation (paper §2.1, Figure 1(c)).
  *
  * Given a pair DataFrame with `l_<attr>` / `r_<attr>` columns, emits a
  * `features: array<double>` column holding one similarity per (attribute,
  * function) combination, in spec order. A pair with a NULL on either side
  * of an attribute gets NaN for that group's features; NaNs are later
  * mean-imputed by [[FeatureGen.imputeAndScale]] (the reference ZeroER
  * implementation does the same for Magellan's NaNs).
  */
object FeatureGen {

  /** Standard spec for a short string attribute (name, title, venue...). */
  def stringSims: Seq[SimFn] = Seq(
    SimFn("lev_sim", StringSims.levSim),
    SimFn("jar_wnk", StringSims.jaroWinkler),
    SimFn("jac_qgm_3", StringSims.jaccardQgram(_, _)),
    SimFn("cos_qgm_3", StringSims.cosineQgram(_, _)),
    SimFn("dice_tok", StringSims.diceTokens),
    SimFn("ovl_tok", StringSims.overlapTokens),
    SimFn("exm", StringSims.exact),
  )

  /** Spec for long text (product descriptions): token-set measures only —
    * edit distance on 60-token strings is meaningless and slow.
    */
  def textSims: Seq[SimFn] = Seq(
    SimFn("jac_tok", StringSims.jaccardTokens),
    SimFn("cos_tok", StringSims.cosineTokens),
    SimFn("dice_tok", StringSims.diceTokens),
    SimFn("ovl_tok", StringSims.overlapTokens),
  )

  /** Spec for short / near-categorical strings (city, venue, cuisine...):
    * Magellan applies a smaller function set to short attributes, which
    * also avoids amplifying coincidental equality of low-cardinality
    * attributes into a dominant covariance block.
    */
  def shortStringSims: Seq[SimFn] = Seq(
    SimFn("lev_sim", StringSims.levSim),
    SimFn("jac_qgm_3", StringSims.jaccardQgram(_, _)),
    SimFn("exm", StringSims.exact),
  )

  /** Spec for categorical codes: equality only. */
  def categoricalSims: Seq[SimFn] = Seq(SimFn("exm", StringSims.exact))

  /** Spec for phone-like attributes: formatting-robust digit equality. */
  def phoneSims: Seq[SimFn] = Seq(
    SimFn("dig_exm", StringSims.digitsExact),
    SimFn("lev_sim", StringSims.levSim),
    SimFn("jac_qgm_3", StringSims.jaccardQgram(_, _)),
  )

  /** Spec for numeric attributes (year, price). */
  def numericSims: Seq[SimFn] = Seq(
    SimFn("rel_sim", StringSims.numericSim),
    SimFn("exm", StringSims.exact),
  )

  /** Flat feature names, `<attr>_<simname>`, in vector order. */
  def featureNames(specs: Seq[AttrSpec]): Seq[String] =
    specs.flatMap(s => s.sims.map(f => s"${s.attr}_${f.name}"))

  /** Feature index -> group (attribute) index, the block structure of §3.1. */
  def groupIndex(specs: Seq[AttrSpec]): Array[Int] =
    specs.zipWithIndex.flatMap { case (s, g) => Seq.fill(s.sims.size)(g) }.toArray

  def numFeatures(specs: Seq[AttrSpec]): Int = specs.map(_.sims.size).sum

  /** Append `features: array<double>` to a pair DataFrame that carries
    * `l_<attr>` and `r_<attr>` string columns for every spec attribute.
    */
  def addFeatures(pairs: DataFrame, specs: Seq[AttrSpec]): DataFrame = {
    val sims    = specs.map(_.sims)
    val compute = udf { (ls: Seq[String], rs: Seq[String]) =>
      val out = Array.newBuilder[Double]
      var g = 0
      while (g < sims.length) {
        val l = ls(g); val r = rs(g)
        sims(g).foreach { fn =>
          out += (if (l == null || r == null) Double.NaN else fn.f(l, r))
        }
        g += 1
      }
      out.result()
    }
    val lArr: Column = array(specs.map(s => col(s"l_${s.attr}").cast("string")): _*)
    val rArr: Column = array(specs.map(s => col(s"r_${s.attr}").cast("string")): _*)
    pairs.withColumn("features", compute(lArr, rArr))
  }

  /** Mean-impute NaNs then min-max scale each feature to [0,1] (paper §3.3:
    * "we first use a min-max scaler to normalize every feature into [0,1]").
    * Constant features scale to 0. Stats are computed over `df` itself.
    */
  def imputeAndScale(df: DataFrame, featCol: String = "features"): DataFrame = {
    val stats = df
      .select(posexplode(col(featCol)).as(Seq("j", "v")))
      .select(col("j"), when(isnan(col("v")), lit(null)).otherwise(col("v")).as("v"))
      .groupBy("j")
      .agg(min("v").as("mn"), max("v").as("mx"), avg("v").as("mean"))
      .collect()
    val d    = df.select(size(col(featCol))).head().getInt(0)
    val mn   = new Array[Double](d)
    val mx   = new Array[Double](d)
    val mean = new Array[Double](d)
    stats.foreach { r =>
      val j = r.getInt(0)
      mn(j)   = Option(r.get(1)).map(_.asInstanceOf[Double]).getOrElse(0.0)
      mx(j)   = Option(r.get(2)).map(_.asInstanceOf[Double]).getOrElse(0.0)
      mean(j) = Option(r.get(3)).map(_.asInstanceOf[Double]).getOrElse(0.0)
    }
    val scale = udf { (xs: Seq[Double]) =>
      val out = new Array[Double](xs.length)
      var j = 0
      while (j < xs.length) {
        val raw   = if (xs(j).isNaN) mean(j) else xs(j)
        val range = mx(j) - mn(j)
        out(j) = if (range <= 0.0) 0.0 else (raw - mn(j)) / range
        j += 1
      }
      out
    }
    df.withColumn(featCol, scale(col(featCol)))
  }
}
