package repro.meta

import org.scalatest.funsuite.AnyFunSuite
import repro.env.Workloads

class MetaFeaturesSpec extends AnyFunSuite {

  test("layout is 11 stage + 64 task = 75 features (§5.1)") {
    assert(MetaFeatures.StageDim == 11)
    assert(MetaFeatures.TaskDim == 64)
    assert(MetaFeatures.Dim == 75)
    assert(MetaFeatures.fromSpec(Workloads.TeraSort).length == 75)
  }

  test("all features lie in [0,1]") {
    Workloads.sixteen.foreach { spec =>
      MetaFeatures.fromSpec(spec).foreach(v => assert(v >= 0.0 && v <= 1.0, spec.name))
    }
  }

  test("deterministic per spec") {
    val a = MetaFeatures.fromSpec(Workloads.KMeans)
    val b = MetaFeatures.fromSpec(Workloads.KMeans)
    assert(a.toSeq == b.toSeq)
  }

  test("distinct workloads produce distinct vectors") {
    val vs = Workloads.sixteen.map(s => MetaFeatures.fromSpec(s).toVector)
    assert(vs.distinct.size == vs.size)
  }

  test("SQL flag is encoded at stage slot 2") {
    val sql = MetaFeatures.fromSpec(Workloads.TeraSort.copy(sql = true))
    val rdd = MetaFeatures.fromSpec(Workloads.TeraSort)
    assert(sql(2) == 1.0 && rdd(2) == 0.0)
  }

  test("iterative workloads flag slot 5 and encode iteration count") {
    val km = MetaFeatures.fromSpec(Workloads.KMeans)
    val wc = MetaFeatures.fromSpec(Workloads.WordCount)
    assert(km(5) == 1.0 && wc(5) == 0.0)
  }

  test("shuffle-heavy tasks are closer to each other than to cpu-bound ones") {
    def l2(a: Array[Double], b: Array[Double]) =
      math.sqrt(a.zip(b).map { case (x, y) => (x - y) * (x - y) }.sum)
    val ts = MetaFeatures.fromSpec(Workloads.TeraSort)
    val so = MetaFeatures.fromSpec(Workloads.Sort)
    val km = MetaFeatures.fromSpec(Workloads.KMeans)
    assert(l2(ts, so) < l2(ts, km))
  }
}
