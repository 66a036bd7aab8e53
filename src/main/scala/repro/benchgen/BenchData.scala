package repro.benchgen

import org.apache.spark.sql.{Dataset, SparkSession}

/** Spark-side corpus builders: benchmark tables are generated in parallel
  * on the executors, deterministically in the table id, so every run (and
  * the DuckDB oracle) sees identical data.
  */
object BenchData {

  /** Default corpus sizes — scaled down from the paper's 1000/200/1000/11000
    * to keep the full suite in CI budget; override per call. The scaling is
    * recorded in EXPERIMENTS.md.
    */
  val DefaultWikipedia = 120
  val DefaultExcel     = 60
  val DefaultSynthetic = 120
  val DefaultFormulas  = 260

  def wikipedia(spark: SparkSession, n: Int = DefaultWikipedia): Dataset[GenTable] = {
    import spark.implicits._
    spark.range(n).as[Long].map(BenchGen.wikipedia)
  }

  def excel(spark: SparkSession, n: Int = DefaultExcel): Dataset[GenTable] = {
    import spark.implicits._
    spark.range(n).as[Long].map(BenchGen.excel)
  }

  def synthetic(spark: SparkSession, n: Int = DefaultSynthetic): Dataset[GenTable] = {
    import spark.implicits._
    spark.range(n).as[Long].map(BenchGen.synthetic)
  }

  def formulas(spark: SparkSession, n: Int = DefaultFormulas): Dataset[GenTable] = {
    import spark.implicits._
    spark.range(n).as[Long].map(BenchGen.formulas)
  }
}
