package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.benchgen._

/** Shared bootstrap for the spark-submit entrypoints (one per evaluation
  * table). Usage: `spark-submit --class repro.jobs.RunDetection repro.jar
  * [nWiki nExcel nSynth]`.
  */
object JobEnv {
  def session(name: String): SparkSession =
    SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def intArg(args: Array[String], i: Int, default: Int): Int =
    args.lift(i).map(_.toInt).getOrElse(default)

  def dump(title: String, df: org.apache.spark.sql.DataFrame): Unit = {
    println(s"== $title ==")
    df.show(100, truncate = false)
  }
}

/** Table 3: benchmark corpus statistics. */
object RunBenchStats {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("table3-bench-stats")
    val all = BenchData.wikipedia(spark, JobEnv.intArg(args, 0, BenchData.DefaultWikipedia))
      .union(BenchData.excel(spark, JobEnv.intArg(args, 1, BenchData.DefaultExcel)))
      .union(BenchData.synthetic(spark, JobEnv.intArg(args, 2, BenchData.DefaultSynthetic)))
      .union(BenchData.formulas(spark, JobEnv.intArg(args, 3, BenchData.DefaultFormulas)))
    JobEnv.dump("Table 3 — Benchmark properties", Metrics.benchStats(all))
    spark.stop()
  }
}

/** Table 5: detection metrics for all systems over all three corpora. */
object RunDetection {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("table5-detection")
    val all = BenchData.wikipedia(spark, JobEnv.intArg(args, 0, BenchData.DefaultWikipedia))
      .union(BenchData.excel(spark, JobEnv.intArg(args, 1, BenchData.DefaultExcel)))
      .union(BenchData.synthetic(spark, JobEnv.intArg(args, 2, BenchData.DefaultSynthetic)))
    val out = EvalHarness.run(spark, all, Systems.all).cache()
    JobEnv.dump("Table 5 — Error detection", Metrics.detection(out).orderBy("benchmark", "system"))
    spark.stop()
  }
}

/** Tables 6 and 7: repair metrics (one run serves both). */
object RunRepair {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("table6-7-repair")
    val all = BenchData.wikipedia(spark, JobEnv.intArg(args, 0, BenchData.DefaultWikipedia))
      .union(BenchData.excel(spark, JobEnv.intArg(args, 1, BenchData.DefaultExcel)))
      .union(BenchData.synthetic(spark, JobEnv.intArg(args, 2, BenchData.DefaultSynthetic)))
    val out = EvalHarness.run(spark, all, Systems.all).cache()
    JobEnv.dump("Table 6 — Error repair", Metrics.repair(out).orderBy("benchmark", "system"))
    JobEnv.dump("Table 7 — Repair over correct detections",
      Metrics.repairGivenDetection(out).orderBy("benchmark", "system"))
    spark.stop()
  }
}

/** Table 8: execution-guided repair on the Excel-Formulas corpus. */
object RunFormulas {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("table8-formulas")
    val tables = BenchData.formulas(spark, JobEnv.intArg(args, 0, BenchData.DefaultFormulas))
    val out = EvalHarness.runFormulas(spark, tables,
      Seq("No Repair", "WMRR", "Raha", "T5", "DataVinci Unsupervised", "DataVinci+Execution"))
    JobEnv.dump("Table 8 — Execution success", Metrics.executionSuccess(out))
    spark.stop()
  }
}

/** Table 9: DataVinci ablations on the synthetic corpus. */
object RunAblations {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("table9-ablations")
    val synth = BenchData.synthetic(spark, JobEnv.intArg(args, 0, BenchData.DefaultSynthetic))
    val out = EvalHarness.run(spark, synth,
      Seq("DataVinci", "NoSemantic", "LimitedConc", "NoLearnedConc", "EditDistRank"))
    JobEnv.dump("Table 9 — Ablations", Metrics.repair(out).orderBy("system"))
    spark.stop()
  }
}

/** Demonstration job: clean one column of a generated table end to end with
  * the DataFrame/UDF API (the distributed-dataflow entry path).
  */
object RunCleanColumn {
  def main(args: Array[String]): Unit = {
    val spark = JobEnv.session("clean-column")
    import spark.implicits._
    val t  = BenchGen.excel(JobEnv.intArg(args, 0, 1))
    val df = t.dirtyTable.cols.head.values.toDF(t.colNames.head)
    val out = repro.core.DataVinciSpark.repairColumn(df, t.colNames.head)
    out.show(50, truncate = false)
    spark.stop()
  }
}
