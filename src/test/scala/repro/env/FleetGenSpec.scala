package repro.env

import org.scalatest.funsuite.AnyFunSuite
import repro.space.{SparkParams => SP}

class FleetGenSpec extends AnyFunSuite {

  test("eightTasks reproduces the paper's manual executor topologies") {
    val cs = FleetGen.prodSpace
    val t = FleetGen.eightTasks
    assert(t.size == 8)
    val fe = t.find(_.name.contains("Feature Extraction")).get
    assert(cs.value(fe.manual, SP.Instances) == 300)
    assert(cs.value(fe.manual, SP.ExecCores) == 2)
    assert(cs.value(fe.manual, SP.ExecMemory) == 8)
  }

  test("eightTasks manual runtimes calibrate to the paper's Table-2 values") {
    val cs = FleetGen.prodSpace
    val targets = Map(
      "Spark: Feature Extraction" -> 6768.99,
      "Spark: User-Traffic Distrib." -> 5543.30,
      "Spark: DAU Analysis" -> 1220.81,
      "Spark: Log Processing" -> 4068.47,
      "Spark SQL: Data Selection" -> 48.29,
      "Spark SQL: Skew Detection" -> 227.03,
      "Spark SQL: Feature Calculation" -> 518.34,
      "Spark SQL: Data Preprossing" -> 23.13)
    FleetGen.eightTasks.foreach { t =>
      val sim = new SparkClusterSim(t.spec, cs)
      val got = sim.expectedRuntime(t.manual, t.spec.inputGB)
      val want = targets(t.name)
      assert(math.abs(got - want) / want < 0.10, s"${t.name}: $got vs $want")
    }
  }

  test("eightTasks manual configurations do not OOM at drifted data sizes") {
    val cs = FleetGen.prodSpace
    FleetGen.eightTasks.foreach { t =>
      val sim = new SparkClusterSim(t.spec, cs)
      (0 until 30).foreach { i =>
        assert(!sim.run(t.manual, i).failed, s"${t.name} failed at iter $i")
      }
    }
  }

  test("fleet is deterministic in its seed") {
    val a = FleetGen.fleet(10, seed = 5)
    val b = FleetGen.fleet(10, seed = 5)
    assert(a == b)
    assert(FleetGen.fleet(10, seed = 6) != a)
  }

  test("fleet tasks have legal manual configs and positive specs") {
    val cs = FleetGen.prodSpace
    FleetGen.fleet(30, seed = 1).foreach { t =>
      assert(cs.clip(t.manual) == t.manual)
      assert(t.spec.inputGB > 0 && t.spec.cpuSecPerGB > 0)
    }
  }

  test("fleet manual configs over-provision memory (the Table-3 asymmetry)") {
    val cs = FleetGen.prodSpace
    val mems = FleetGen.fleet(50, seed = 2).map(t => cs.value(t.manual, SP.ExecMemory))
    assert(mems.sum / mems.size >= 6.0)
  }

  test("fleet manual configs chunk partitions at ~1GB, floored at 200") {
    val cs = FleetGen.prodSpace
    FleetGen.fleet(10, seed = 3).foreach { t =>
      val par = cs.value(t.manual, SP.Parallelism)
      assert(par == math.max(200, t.spec.inputGB.toInt).toDouble)
    }
  }

  test("most fleet manual runs are feasible (engineers' configs do run)") {
    val cs = FleetGen.prodSpace
    val fails = FleetGen.fleet(40, seed = 4).count { t =>
      new SparkClusterSim(t.spec, cs).run(t.manual, 0).failed
    }
    assert(fails <= 8, s"$fails of 40 manual configs OOM")
  }
}
