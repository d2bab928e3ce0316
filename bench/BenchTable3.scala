package repro.bench

import repro.SparkSpec
import repro.jobs.Table3Job

/** Table 3 bench: fleet-average reductions, under-tuning and post-tuning
  * vs pre-tuning, on the synthetic production fleet (2,000 tasks stand in
  * for the paper's 25K — DESIGN.md §2). Runs as a parallel Spark job.
  *
  * Paper numbers: under-tuning mem +2.28%, cpu −5.82%, runtime +1.63%;
  * post-tuning mem +57.00%, cpu +34.93%, runtime +10.72% (positive =
  * reduction). Shape asserted: post ≫ under, memory > CPU reduction,
  * post-memory > 40%.
  */
class BenchTable3 extends SparkSpec {

  private val FleetSize = sys.env.getOrElse("FLEET_SIZE", "2000").toInt

  private lazy val result = Table3Job.run(spark, FleetSize)

  test("reproduce Table 3 (prints the table)") {
    val (t3, rows) = result
    println(s"Fleet size: $FleetSize (paper: 25K tasks)")
    print(Table3Job.render(t3))
    assert(rows.size == FleetSize)
  }

  test("post-tuning memory reduction is large (paper: 57.00%)") {
    assert(result._1.postMem > 40.0, f"post mem ${result._1.postMem}%.2f%%")
  }

  test("post-tuning memory reduction exceeds CPU reduction (57% vs 35%)") {
    assert(result._1.postMem > result._1.postCpu)
  }

  test("post-tuning CPU reduction is positive (paper: 34.93%)") {
    assert(result._1.postCpu > 10.0, f"post cpu ${result._1.postCpu}%.2f%%")
  }

  test("under-tuning reductions are much smaller than post-tuning (overhead)") {
    val t = result._1
    assert(t.underMem < t.postMem - 10.0)
    assert(t.underCpu < t.postCpu)
  }

  test("post-tuning runtime does not collapse (constraint respected on average)") {
    // The 2×-manual constraint bounds runtime inflation at −100%; in our
    // simulator the cost optimum often sits at that bound (see
    // EXPERIMENTS.md — the paper instead measured a 10.72% reduction).
    assert(result._1.postRt > -110.0, f"post runtime ${result._1.postRt}%.2f%%")
  }
}
