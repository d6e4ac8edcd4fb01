package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Tables

/** Table 2 reproduction: dataset summary (predicate positivity p, proxy
  * correlation r). Our synthetic analogues must realize the paper's
  * published per-dataset characteristics — that is the claim this bench
  * checks, and its printed rows are the measured table.
  */
class Table2Bench extends AnyFunSuite {

  private lazy val scale = Tables.Scale.fromEnv()
  private lazy val rows = Tables.table2(scale.length)

  test("Table 2: print paper vs measured dataset summary") {
    println("=== Table 2: dataset summary (paper targets vs measured) ===")
    println(Tables.renderTable2(rows))
    assert(rows.size == 6)
  }

  test("Table 2: measured predicate positivity matches the paper per dataset") {
    rows.foreach { r =>
      assert(math.abs(r.measuredP - r.paperP) < 0.06,
        s"${r.dataset}: p=${r.measuredP} vs paper ${r.paperP}")
    }
  }

  test("Table 2: measured proxy correlation matches the paper per dataset") {
    rows.foreach { r =>
      assert(math.abs(r.measuredR - r.paperR) < 0.03,
        s"${r.dataset}: r=${r.measuredR} vs paper ${r.paperR}")
    }
  }

  test("Table 2: positivity rates span the paper's range (0.37 to 0.89)") {
    assert(rows.map(_.measuredP).min < 0.45)
    assert(rows.map(_.measuredP).max > 0.8)
  }
}
