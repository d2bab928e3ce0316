package repro.jobs

import org.scalatest.funsuite.AnyFunSuite
import repro.core.FleetRow

class JobsRenderSpec extends AnyFunSuite {

  private val row = FleetRow("Spark: Unit Test", 100.0, 50.0, 1000.0, 123456.0,
    90.0, 55.0, 980.0, 40.0, 30.0, 900.0, 45678.0, 7, 32, 2, 4)

  test("Table2Job.render emits Manual and Ours lines per task plus a summary") {
    val out = Table2Job.render(Vector(("Spark: Unit Test", row)))
    assert(out.contains("Manual"))
    assert(out.contains("Ours"))
    assert(out.contains("Avg reduction"))
    assert(out.linesIterator.size == 4) // header + 2 rows + summary
  }

  test("Table2Job.render reports the tuned executor topology") {
    val out = Table2Job.render(Vector(("Spark: Unit Test", row)))
    val ours = out.linesIterator.find(_.contains("Ours")).get
    assert(ours.contains("32") && ours.contains("7"))
  }

  test("Table3Job.render prints the three metric rows") {
    val t = repro.core.TuningService.Table3(2.28, -5.82, 1.63, 57.0, 34.93, 10.72)
    val out = Table3Job.render(t)
    assert(out.contains("Memory usage"))
    assert(out.contains("CPU usage"))
    assert(out.contains("Runtime"))
    assert(out.contains("57.00"))
    assert(out.contains("-5.82"))
  }

  test("Table4Job.render aligns the five cost columns") {
    val r = Table4Job.Row("terasort", "sort", 844.70, 91.3, 54.51, 40.66, 43.77)
    val out = Table4Job.render(Vector(r))
    assert(out.contains("terasort"))
    assert(out.contains("844.70") && out.contains("40.66"))
  }

  test("Table5Job.render shows rank, name, and mean +- std") {
    val out = Table5Job.render(Vector(
      Table5Job.Row(1, "spark.executor.instances", 0.3788, 0.1965)))
    assert(out.contains("spark.executor.instances"))
    assert(out.contains("0.3788 +- 0.1965"))
  }

  test("HiBenchCompareJob.means averages across seeds") {
    val cells = Seq(
      HiBenchCompareJob.Cell("t", "Ours", 1.0, 1, 10.0),
      HiBenchCompareJob.Cell("t", "Ours", 1.0, 2, 20.0),
      HiBenchCompareJob.Cell("t", "Ours", 0.5, 3, 99.0))
    val m = HiBenchCompareJob.means(cells, 1.0)
    assert(m(("t", "Ours")) == 15.0)
    assert(!m.contains(("t", "RandomSearch")))
  }
}
