package repro.bench

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.SparkSpec
import repro.benchgen._

/** Shared, lazily-computed benchmark state for the per-table bench suites.
  *
  * All suites run in one forked JVM (`Test / parallelExecution := false`),
  * so corpora and the expensive system×table outcome datasets are computed
  * once and reused by Tables 5, 6 and 7.
  *
  * Corpus sizes are scaled down from the paper (1000/200/1000/11000 tables)
  * to CI budget; override with REPRO_WIKI / REPRO_EXCEL / REPRO_SYNTH /
  * REPRO_FORMULAS. The scaling is recorded in EXPERIMENTS.md.
  */
object BenchRun {
  lazy val spark: SparkSession = SparkSpec.shared

  private def size(env: String, default: Int): Int =
    sys.env.get(env).map(_.toInt).getOrElse(default)

  lazy val wikiN  = size("REPRO_WIKI", BenchData.DefaultWikipedia)
  lazy val excelN = size("REPRO_EXCEL", BenchData.DefaultExcel)
  lazy val synthN = size("REPRO_SYNTH", BenchData.DefaultSynthetic)
  lazy val formN  = size("REPRO_FORMULAS", BenchData.DefaultFormulas)

  lazy val wikipedia: Dataset[GenTable] = BenchData.wikipedia(spark, wikiN).cache()
  lazy val excel: Dataset[GenTable]     = BenchData.excel(spark, excelN).cache()
  lazy val synthetic: Dataset[GenTable] = BenchData.synthetic(spark, synthN).cache()
  lazy val formulas: Dataset[GenTable]  = BenchData.formulas(spark, formN).cache()

  /** The 8 evaluation systems over the 3 detection/repair corpora. */
  lazy val outcomes: Dataset[CellOutcome] = {
    val all = wikipedia.union(excel).union(synthetic)
    EvalHarness.run(spark, all, Systems.all).cache()
  }

  /** Pretty-print a metric DataFrame as a paper-style table. */
  def show(title: String, df: DataFrame): Unit = {
    println(s"\n================ $title ================")
    df.collect().foreach { row =>
      println(row.schema.fieldNames.zip(row.toSeq).map { case (n, v) => s"$n=$v" }.mkString("  "))
    }
    println("=" * (34 + title.length))
  }

  /** Metric lookup helper: (benchmark, system) → named column value. */
  def metric(df: DataFrame, benchmark: String, system: String, colName: String): Double = {
    val rows = df.collect().filter(r =>
      r.getAs[String]("benchmark") == benchmark && r.getAs[String]("system") == system)
    require(rows.nonEmpty, s"no row for $benchmark/$system")
    rows.head.getAs[Any](colName) match {
      case d: Double => d
      case l: Long   => l.toDouble
      case i: Int    => i.toDouble
      case x         => x.toString.toDouble
    }
  }
}
