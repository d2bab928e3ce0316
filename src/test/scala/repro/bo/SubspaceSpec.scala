package repro.bo

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.space.SparkParams

class SubspaceSpec extends AnyFunSuite {
  private val cs = SparkParams.space()

  private def fresh = new Subspace(cs, SparkParams.ExpertRanking)

  test("initial size is K_init = 10") { assert(fresh.size == 10) }

  test("free dims are the top-K of the expert ranking initially") {
    val s = fresh
    val expected = SparkParams.ExpertRanking.take(10).map(cs.indexOf).toSet
    assert(s.freeDims == expected)
  }

  test("three consecutive successes grow the sub-space by 2 (τ_succ=3)") {
    val s = fresh
    (1 to 3).foreach(_ => s.observe(improved = true))
    assert(s.size == 12)
  }

  test("five consecutive failures shrink the sub-space by 2 (τ_fail=5)") {
    val s = fresh
    (1 to 5).foreach(_ => s.observe(improved = false))
    assert(s.size == 8)
  }

  test("interleaved outcomes reset the streak counters") {
    val s = fresh
    s.observe(true); s.observe(true); s.observe(false)
    s.observe(true); s.observe(true); s.observe(false)
    assert(s.size == 10) // never 3 in a row
  }

  test("size never exceeds K_max = dim") {
    val s = fresh
    (1 to 60).foreach(_ => s.observe(improved = true))
    assert(s.size == cs.dim)
  }

  test("size never drops below K_min = 4") {
    val s = fresh
    (1 to 100).foreach(_ => s.observe(improved = false))
    assert(s.size == 4)
  }

  test("counters reset after a resize (growth needs a fresh streak)") {
    val s = fresh
    (1 to 3).foreach(_ => s.observe(true)) // -> 12, counters reset
    s.observe(true); s.observe(true)
    assert(s.size == 12) // only 2 successes since resize
    s.observe(true)
    assert(s.size == 14)
  }

  test("maybeRefit replaces the ranking from history via fANOVA") {
    val s = new Subspace(cs, SparkParams.ExpertRanking, refitEvery = 1, minHistoryForFanova = 10)
    val rng = new Random(3)
    val iMem = cs.indexOf(SparkParams.ExecMemory)
    // Synthetic history where only executor.memory matters.
    val configs = Vector.fill(40)(cs.sampleRandom(rng))
    val ys = configs.map(c => cs.toUnit(c)(iMem) * 10.0)
    s.maybeRefit(configs, ys, seed = 1)
    assert(s.currentRanking.head == iMem)
  }

  test("maybeRefit is a no-op below the history threshold") {
    val s = new Subspace(cs, SparkParams.ExpertRanking, refitEvery = 1)
    val before = s.currentRanking
    s.maybeRefit(Vector.empty, Vector.empty, 0)
    assert(s.currentRanking == before)
  }
}
