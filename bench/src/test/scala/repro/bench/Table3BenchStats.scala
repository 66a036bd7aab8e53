package repro.bench

import repro.SparkSpec
import repro.benchgen.Metrics

/** Table 3: benchmark corpus statistics (# tables, avg cols, avg rows).
  * Paper: Wikipedia 1000×5.1×27.3, Excel 200×1.6×523.4,
  * Synthetic 1000×4.3×447.5, Formulas 11000×1.4×216.5.
  * Our corpora are scaled in table count (and Excel/Formulas row count)
  * but preserve the shape: Wikipedia many-column/short, Excel
  * few-column/long, Formulas mostly single-input.
  */
class Table3BenchStats extends SparkSpec {

  test("Table 3: benchmark properties") {
    import BenchRun._
    val all = wikipedia.union(excel).union(synthetic).union(formulas)
    val stats = Metrics.benchStats(all)
    show("Table 3 — Benchmark properties", stats)

    val rows = stats.collect().map(r =>
      r.getAs[String]("benchmark") -> (r.getAs[Long]("tables"), r.getAs[Double]("avgCols"), r.getAs[Double]("avgRows"))).toMap

    // shape: wikipedia is many-column & short; excel few-column & long
    val (wc, wr) = (rows("wikipedia")._2, rows("wikipedia")._3)
    val (ec, er) = (rows("excel")._2, rows("excel")._3)
    assert(wc >= 4.0 && wc <= 6.0)
    assert(wr >= 20 && wr <= 35)
    assert(ec <= 2.0)
    assert(er > 3 * wr)
    // formulas: avg input cols near the paper's 1.4
    assert(rows("formulas")._2 >= 1.0 && rows("formulas")._2 <= 2.5)
    assert(rows("synthetic")._2 >= 3.0 && rows("synthetic")._2 <= 5.0)
  }
}
