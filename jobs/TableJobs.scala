package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchTables

/** spark-submit entrypoints, one per evaluation table:
  *
  *   spark-submit --class repro.jobs.Table2Job repro.jar
  *
  * Each prints the measured table (with the paper's numbers below it) and
  * writes a TSV under bench_results/.
  */
object JobSession {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("table1")
    try println(BenchTables.table1(Some(spark))) finally spark.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = println(BenchTables.table2())
}

object Table3Job {
  def main(args: Array[String]): Unit = println(BenchTables.table3())
}

object Table4Job {
  def main(args: Array[String]): Unit = println(BenchTables.table4())
}

object Table5Job {
  def main(args: Array[String]): Unit = println(BenchTables.table5())
}

object Table6Job {
  def main(args: Array[String]): Unit = println(BenchTables.table6())
}

/** Distributed HBBMC++ on the heavier datasets (extra table). */
object DistJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("dist-mce")
    try println(BenchTables.distTable(spark)) finally spark.stop()
  }
}

/** Run one dataset with one named configuration through Spark, e.g.
  * `MceRunJob OR hbbmcPP`.
  */
object MceRunJob {
  def main(args: Array[String]): Unit = {
    val name = if (args.nonEmpty) args(0) else "FB"
    val cfgName = if (args.length > 1) args(1) else "hbbmcPP"
    val cfg = cfgName match {
      case "hbbmcPP" => repro.mce.MceConfig.hbbmcPP
      case "hbbmcP"  => repro.mce.MceConfig.hbbmcP
      case "rDegen"  => repro.mce.MceConfig.rDegen
      case "rRef"    => repro.mce.MceConfig.rRef
      case "rRcd"    => repro.mce.MceConfig.rRcd
      case "rFac"    => repro.mce.MceConfig.rFac
      case "ebbmc"   => repro.mce.MceConfig.ebbmc
      case other     => sys.error(s"unknown config $other")
    }
    val spark = JobSession.session(s"mce-$name-$cfgName")
    try {
      val g = BenchTables.dataset(name)
      val stats = repro.dist.DistMCE.run(spark, g, cfg)
      println(s"dataset=$name cfg=$cfgName cliques=${stats.cliques} " +
        s"maxSize=${stats.maxSize} calls=${stats.calls} et=${stats.etApplied}")
    } finally spark.stop()
  }
}
