package repro.core

import repro.SparkSpec
import repro.workload.{Covid, MoseiHigh}

class QualityMatrixSpec extends SparkSpec {

  private lazy val configs = Covid.profiles.sortBy(_.unitCost).grouped(8).map(_.head).toVector
  private lazy val trace = QualityMatrix.trace(spark, Covid, 1, configs)

  test("trace dimensions") {
    assert(trace.nSegments == 86400 / 2)
    assert(trace.nConfigs == configs.length)
    assert(trace.qual.length == trace.nSegments)
    assert(trace.cost.length == trace.nSegments)
  }

  test("trace values match the scalar workload model") {
    val idxs = Seq(0, 1000, 20000, trace.nSegments - 1)
    for (i <- idxs; k <- configs.indices) {
      val p = configs(k)
      val expQ = Covid.quality(p, i.toLong, trace.difficulty(i), trace.load(i))
      val expC = Covid.costPerSec(p, trace.load(i)) * Covid.segSec
      assert(math.abs(trace.qual(i)(k) - expQ) < 1e-9, s"qual seg=$i k=$k")
      assert(math.abs(trace.cost(i)(k) - expC) < 1e-9, s"cost seg=$i k=$k")
    }
  }

  test("day index is ordered and dayStart finds boundaries") {
    assert(trace.day.head == 0)
    assert(trace.dayStart(0) == 0)
    val t2 = QualityMatrix.trace(spark, Covid, 2, configs.take(2))
    assert(t2.dayStart(1) == 86400 / 2)
    assert(t2.day(t2.dayStart(1)) == 1)
    assert(t2.day(t2.dayStart(1) - 1) == 0)
  }

  test("slice preserves alignment") {
    val s = trace.slice(100, 200)
    assert(s.nSegments == 100)
    assert(s.difficulty(0) == trace.difficulty(100))
    assert(s.qual(5)(0) == trace.qual(105)(0))
    assert(s.configs == trace.configs)
  }

  test("maxTotalQuality is an upper bound on any config's total") {
    for (k <- configs.indices) {
      val tot = trace.qual.map(_(k)).sum
      assert(tot <= trace.maxTotalQuality + 1e-9)
    }
    assert(trace.maxTotalQuality > 0)
  }

  test("MOSEI trace carries varying load and load-scaled costs") {
    val cfgs = MoseiHigh.profiles.filter(p => p.streamCap == 16.0).sortBy(_.unitCost)
      .grouped(10).map(_.head).toVector
    val t = QualityMatrix.trace(spark, MoseiHigh, 1, cfgs)
    assert(t.load.distinct.length > 3)
    val i = t.load.indexWhere(_ > 20)
    assert(i >= 0)
    assert(math.abs(t.cost(i)(0) - cfgs(0).unitCost * 16.0 * MoseiHigh.segSec) < 1e-9)
  }
}
