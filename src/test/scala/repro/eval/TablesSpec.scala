package repro.eval

import repro.SparkSpec

/** Structural checks of the table harness at toy scale — the real
  * reproductions (paper-scale streams, full trial counts, shape
  * assertions) live in the bench suites.
  */
class TablesSpec extends SparkSpec {

  private val tiny = Tables.Scale(length = 10000, trials = 4, advPerShift = 1, advLength = 5000)

  test("table2 produces one calibrated row per catalogue dataset") {
    val rows = Tables.table2(length = 30000)
    assert(rows.map(_.dataset) == repro.data.Datasets.names)
    rows.foreach { r =>
      assert(r.measuredP > 0 && r.measuredP < 1)
      assert(math.abs(r.measuredR - r.paperR) < 0.05)
    }
    val rendered = Tables.renderTable2(rows)
    assert(rendered.linesIterator.size == 7)
  }

  test("rmseSummary covers every (dataset, budget, algorithm) cell") {
    val s = Tables.rmseSummary(spark, usePredicate = false, tiny)
    assert(s.detail.size == 6 * 3 * 4)
    Algorithms.All.foreach { a =>
      val byBudget = s.rmse(a)
      assert(byBudget.keySet == Set("500", "2500", "5000", "All"))
      byBudget.values.foreach(v => assert(v > 0 && !v.isNaN))
    }
    val rendered = Tables.renderRmseSummary(s)
    assert(rendered.contains("RMSE_inquest"))
    assert(rendered.contains("improvement vs abae"))
  }

  test("adversarial summary covers every shift count") {
    val s = Tables.adversarial(spark, tiny, budgetTotal = 250, trials = 3)
    assert(s.byShift.keySet == Set(1, 2, 3, 4, 5))
    s.byShift.values.foreach { byAlgo =>
      assert(byAlgo.keySet == Algorithms.All.toSet)
    }
    assert(Tables.renderAdversarial(s).contains("RMSE_uniform"))
  }

  test("Scale.fromEnv falls back to paper-scale defaults") {
    val s = Tables.Scale.fromEnv()
    assert(s.length > 0 && s.trials > 0 && s.advPerShift > 0 && s.advLength > 0)
  }
}
