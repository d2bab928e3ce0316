package repro.env

import org.scalatest.funsuite.AnyFunSuite
import repro.space.{SparkParams => SP}

class SparkClusterSimSpec extends AnyFunSuite {
  private val cs = FleetGen.hibenchSpace
  private val sim = new SparkClusterSim(Workloads.TeraSort, cs)
  private val base = FleetGen.manualConfig(cs, instances = 16, cores = 4, memGB = 8,
    parallelism = 256)

  private def rt(c: repro.space.Config): Double =
    sim.expectedRuntime(c, Workloads.TeraSort.inputGB)

  test("more executors reduce runtime (waves)") {
    val few = cs.withValue(base, SP.Instances, 4)
    val many = cs.withValue(base, SP.Instances, 32)
    assert(rt(many) < rt(few))
  }

  test("diminishing returns: speedup from 16→32 < from 4→8 executors") {
    def at(e: Int) = rt(cs.withValue(base, SP.Instances, e))
    val s1 = at(4) / at(8)
    val s2 = at(16) / at(32)
    assert(s2 < s1)
  }

  test("too little memory causes spill slow-down") {
    val small = cs.withValue(cs.withValue(base, SP.ExecMemory, 2), SP.Parallelism, 64)
    val big = cs.withValue(cs.withValue(base, SP.ExecMemory, 16), SP.Parallelism, 64)
    assert(rt(small) > rt(big))
  }

  test("starving memory OOMs (fails) and inflates runtime") {
    val starved = cs.withValue(cs.withValue(base, SP.ExecMemory, 1), SP.Parallelism, 8)
    assert(sim.fails(starved, Workloads.TeraSort.inputGB))
    val ok = cs.withValue(base, SP.ExecMemory, 16)
    assert(!sim.fails(ok, Workloads.TeraSort.inputGB))
    assert(rt(starved) > rt(cs.withValue(starved, SP.ExecMemory, 16)))
  }

  test("raising parallelism relieves memory pressure on big inputs") {
    val lowPar = cs.withValue(base, SP.Parallelism, 16)
    val highPar = cs.withValue(base, SP.Parallelism, 512)
    assert(rt(highPar) < rt(lowPar))
  }

  test("shuffle compression helps a shuffle-heavy workload") {
    val on = cs.withValue(base, SP.ShuffleCompress, 0)  // "true"
    val off = cs.withValue(base, SP.ShuffleCompress, 1) // "false"
    assert(rt(on) < rt(off))
  }

  test("kryo serializer is faster than java") {
    val java = cs.withValue(base, SP.Serializer, 0)
    val kryo = cs.withValue(base, SP.Serializer, 1)
    assert(rt(kryo) < rt(java))
  }

  test("bigger shuffle file buffer reduces shuffle cost") {
    val small = cs.withValue(base, SP.ShuffleFileBuffer, 16)
    val large = cs.withValue(base, SP.ShuffleFileBuffer, 128)
    assert(rt(large) < rt(small))
  }

  test("resource function is the paper's analytic form") {
    val c = FleetGen.manualConfig(cs, 10, 4, 8)
    assert(sim.resource(c) == 10 * (4 + 0.25 * 8))
  }

  test("runtime scales with data size") {
    assert(sim.expectedRuntime(base, 64.0) > sim.expectedRuntime(base, 16.0))
  }

  test("run is reproducible for the same iteration") {
    val a = sim.run(base, 3)
    val b = sim.run(base, 3)
    assert(a == b)
  }

  test("noise is multiplicative and bounded (~log-normal 4%)") {
    val rts = (0 until 24).map(i => sim.runAt(base, Workloads.TeraSort.inputGB, i).runtimeSec)
    val exp = rt(base)
    rts.foreach(t => assert(t > exp * 0.8 && t < exp * 1.25))
  }

  test("usage metrics follow allocation × hours") {
    val r = sim.run(base, 0)
    val e = cs.value(base, SP.Instances); val c = cs.value(base, SP.ExecCores)
    val m = cs.value(base, SP.ExecMemory)
    assert(math.abs(r.memUsageGBh - e * m * r.runtimeSec / 3600) < 1e-9)
    assert(math.abs(r.cpuUsageCoreH - e * c * r.runtimeSec / 3600) < 1e-9)
  }

  test("data-size drift is periodic and positive") {
    val spec = Workloads.TeraSort
    val ds = (0 until 48).map(spec.dataSizeAt)
    assert(ds.forall(_ > 0))
    assert(ds.max / ds.min > 1.05) // drift actually moves
    assert(ds.max < spec.inputGB * 1.4)
  }

  test("iterative workload pays for cache misses") {
    val km = new SparkClusterSim(Workloads.KMeans, cs)
    val noCache = cs.withValue(cs.withValue(base, SP.StorageFraction, 0.1),
      SP.ExecMemory, 1)
    val cached = cs.withValue(cs.withValue(base, SP.StorageFraction, 0.6),
      SP.ExecMemory, 16)
    assert(km.expectedRuntime(noCache, Workloads.KMeans.inputGB) >
           km.expectedRuntime(cached, Workloads.KMeans.inputGB))
  }

  test("calibrate hits a target manual runtime within 5%") {
    val spec = WorkloadSpec("cal", inputGB = 100, cpuSecPerGB = 100, shuffleFrac = 0.5,
      numStages = 3, seed = 9)
    val manual = FleetGen.manualConfig(FleetGen.prodSpace, 100, 2, 8)
    val cal = SparkClusterSim.calibrate(spec, FleetGen.prodSpace, manual, 1234.0)
    val got = new SparkClusterSim(cal, FleetGen.prodSpace).expectedRuntime(manual, cal.inputGB)
    assert(math.abs(got - 1234.0) / 1234.0 < 0.05)
  }

  test("SQL workloads read parallelism from shuffle.partitions") {
    val sqlSpec = Workloads.TeraSort.copy(sql = true)
    val s2 = new SparkClusterSim(sqlSpec, cs)
    val lowShuf = cs.withValue(cs.withValue(base, SP.ShufflePartitions, 16), SP.Parallelism, 1000)
    val hiShuf = cs.withValue(cs.withValue(base, SP.ShufflePartitions, 512), SP.Parallelism, 8)
    assert(s2.expectedRuntime(hiShuf, 32) < s2.expectedRuntime(lowShuf, 32))
  }
}
