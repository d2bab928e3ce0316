package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

/** End-to-end smoke of the table jobs at reduced budgets — the full-budget
  * runs are the bench suites; these only prove the pipelines compose. */
class JobsSmokeSpec extends AnyFunSuite {

  test("Table4Job.rows produces four complete pairs at a small budget") {
    val rows = Table4Job.rows(budget = 8)
    assert(rows.size == 4)
    rows.foreach { r =>
      assert(r.default > 0 && r.manual > 0)
      assert(!r.top1.isNaN && !r.top2.isNaN && !r.top3.isNaN)
    }
  }

  test("Table4Job default is the Spark default config, manual is hand-sized") {
    val cs = repro.env.FleetGen.hibenchSpace
    assert(cs.value(Table4Job.defaultConfig, repro.space.SparkParams.Instances) == 2)
    assert(cs.value(Table4Job.manualConfig, repro.space.SparkParams.Instances) == 16)
  }

  test("Table5Job.rows yields 10 ranked rows with descending means") {
    val rows = Table5Job.rows(nPerTask = 30, seed = 2)
    assert(rows.size == 10)
    assert(rows.map(_.rank) == (1 to 10).toVector)
    rows.sliding(2).foreach(p => assert(p.head.mean >= p.last.mean))
  }

  test("Table2Job.rows at tiny budget still respects constraints") {
    val rows = Table2Job.rows(budget = 6)
    assert(rows.size == 8)
    rows.foreach { case (n, r) =>
      assert(r.postRuntime <= 2.0 * r.preRuntime * 1.15, n)
    }
  }

  test("HiBenchCompareJob.runOne returns a finite best objective") {
    val cell = HiBenchCompareJob.runOne("wordcount", "Ours", beta = 1.0, seed = 3, budget = 8)
    assert(cell.best > 0 && !cell.best.isInfinite)
    val cellCost = HiBenchCompareJob.runOne("wordcount", "RandomSearch", 0.5, 3, 8)
    assert(cellCost.best > 0)
  }
}
