package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.Zeroer
import repro.core.ZeroerModel.Config
import repro.erdata.Datasets
import repro.eval.{Metrics, Tables}

/** spark-submit entrypoints, one per evaluation table plus a plain ZeroER
  * runner. Args: [scale] (default 1.0); Table jobs iterate all datasets.
  *
  *   spark-submit --class repro.jobs.Table3Job target/scala-2.13/repro_*.jar 0.5
  */
private object JobSession {
  def spark(app: String): SparkSession =
    SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
  def scaleOf(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(1.0)
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("zeroer-table1")
    Tables.table1(s, JobSession.scaleOf(args)).foreach { r =>
      println(f"${r.dataset}: cos(S_M,S_U)=${r.cosCov}%.3f cos(R_M,R_U)=${r.cosCorr}%.3f")
    }
    s.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark("zeroer-table2")
    Tables.table2(s, JobSession.scaleOf(args)).foreach { r =>
      println(s"${r.dataset}: ${r.nLeft} x ${r.nRight}, ${r.nMatch} matches, ${r.nAttrs} attrs")
    }
    s.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val s     = JobSession.spark("zeroer-table3")
    val scale = JobSession.scaleOf(args)
    Datasets.names.foreach { n =>
      val r = Tables.table3Row(s, n, scale)
      println(s"$n: " + Tables.table3Methods.map(m => f"$m=${r.f1(m)}%.3f(${r.ms(m)}ms)").mkString(" "))
    }
    s.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val s     = JobSession.spark("zeroer-table4")
    val scale = JobSession.scaleOf(args)
    Datasets.names.foreach { n =>
      val r = Tables.table4Row(s, n, scale)
      val cells = r.labels.map { case (m, v) => s"$m=${v.map(_.toString).getOrElse(s"${r.total}*")}" }
      println(f"$n (target F1 ${r.target}%.3f): ${cells.mkString(" ")}")
    }
    s.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val s     = JobSession.spark("zeroer-table5")
    val scale = JobSession.scaleOf(args)
    Datasets.names.foreach { n =>
      val r = Tables.table5Row(s, n, scale)
      println(s"$n: " + Tables.table5Columns.map(c => f"'$c'=${r.f1(c)}%.3f").mkString(" "))
    }
    s.stop()
  }
}

/** Run ZeroER end-to-end on one dataset: RunZeroer <FZ|DA|DS|AB|AG> [scale]. */
object RunZeroer {
  def main(args: Array[String]): Unit = {
    require(args.nonEmpty, "usage: RunZeroer <dataset> [scale]")
    val s     = JobSession.spark("zeroer-run")
    val scale = args.lift(1).map(_.toDouble).getOrElse(1.0)
    val ds    = Datasets.byName(s, args(0), scale)
    val res   = Zeroer.run(s, ds, Config())
    val prf   = Metrics.prf(res.predictions, ds.truth)
    println(f"${ds.name}: P=${prf.precision}%.4f R=${prf.recall}%.4f F1=${prf.f1}%.4f " +
      s"iters=${res.iters} converged=${res.converged} runtimeMs=${res.runtimeMs}")
    res.predictions.show(20, truncate = false)
    s.stop()
  }
}
