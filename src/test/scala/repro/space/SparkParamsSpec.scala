package repro.space

import org.scalatest.funsuite.AnyFunSuite

class SparkParamsSpec extends AnyFunSuite {

  test("default space bounds follow constructor arguments") {
    val cs = SparkParams.space(maxInstances = 100, maxCores = 4, maxMemGB = 16)
    val inst = cs.params(cs.indexOf(SparkParams.Instances)).asInstanceOf[IntParam]
    assert(inst.hi == 100)
    val cores = cs.params(cs.indexOf(SparkParams.ExecCores)).asInstanceOf[IntParam]
    assert(cores.hi == 4)
    val mem = cs.params(cs.indexOf(SparkParams.ExecMemory)).asInstanceOf[IntParam]
    assert(mem.hi == 16)
  }

  test("resource-heavy parameters are log-scaled") {
    val cs = SparkParams.space()
    assert(cs.params(cs.indexOf(SparkParams.Instances)).asInstanceOf[IntParam].log)
    assert(cs.params(cs.indexOf(SparkParams.Parallelism)).asInstanceOf[IntParam].log)
  }

  test("defaults are legal and match Spark documentation values") {
    val cs = SparkParams.space()
    val d = SparkParams.defaults(cs)
    assert(cs.clip(d) == d)
    assert(cs.value(d, SparkParams.Instances) == 2)
    assert(cs.value(d, SparkParams.ExecMemory) == 1)
    assert(cs.value(d, SparkParams.MemoryFraction) == 0.6)
    assert(cs.value(d, SparkParams.StorageFraction) == 0.5)
    assert(cs.value(d, SparkParams.ShufflePartitions) == 200)
    assert(cs.value(d, SparkParams.Parallelism) == 8)
    assert(cs.choice(d, SparkParams.Serializer).contains("JavaSerializer"))
  }

  test("expert ranking covers all 30 parameters exactly once") {
    val cs = SparkParams.space()
    assert(SparkParams.ExpertRanking.size == 30)
    assert(SparkParams.ExpertRanking.distinct.size == 30)
    SparkParams.ExpertRanking.foreach(n => assert(cs.contains(n), n))
  }

  test("expert ranking leads with the Table-5 head parameters") {
    assert(SparkParams.ExpertRanking.take(2) ==
      Vector(SparkParams.Instances, SparkParams.ExecMemory))
  }

  test("hibench and prod spaces share the parameter list, not the ranges") {
    val a = repro.env.FleetGen.hibenchSpace
    val b = repro.env.FleetGen.prodSpace
    assert(a.params.map(_.name) == b.params.map(_.name))
    assert(a.params(a.indexOf(SparkParams.Instances)).asInstanceOf[IntParam].hi == 48)
    assert(b.params(b.indexOf(SparkParams.Instances)).asInstanceOf[IntParam].hi == 800)
  }
}
