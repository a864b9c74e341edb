package repro.core

import repro.SparkSpec
import repro.baselines.{Optimum, StaticBaseline}
import repro.workload.Covid

/** End-to-end integration: offline fit + simulated online ingestion on a
  * short COVID-style stream (2 train days, 1 test day).
  */
class SkyscraperSpec extends SparkSpec {

  private lazy val hyper = Hyper(
    nCategories = 3,
    forecast = ForecastSpec(inputDays = 0.5, nSplits = 4, horizonDays = 0.5,
                            sampleEveryMin = 30),
    preSampleSize = 800)

  private lazy val (model, train, test) =
    Skyscraper.fitAndTrace(spark, Covid, hyper, trainDays = 2, testDays = 1)

  private def run(cores: Int, cloud: Double = 0.0, useBuffer: Boolean = true,
                  useCloud: Boolean = true) =
    Skyscraper.run(model, test, cores, bufferBytes = 4e9, cloudBudget = cloud,
                   useBuffer = useBuffer, useCloud = useCloud)

  test("offline phase produces a usable model") {
    assert(model.configs.size >= 3 && model.configs.size <= 14)
    assert(model.cats.n == 3)
    assert(model.trainCats.length == train.nSegments)
    assert(model.costHat.length == 3)
    val p = model.forecaster.predict(model.trainCats, model.trainCats.length)
    assert(math.abs(p.sum - 1.0) < 1e-9)
  }

  test("train/test split boundaries are clean") {
    assert(train.nSegments == 2 * 86400 / 2)
    assert(test.nSegments == 86400 / 2)
    assert(train.day.last == 1 && test.day.head == 2)
  }

  test("never overflows the buffer (the V-ETL hard constraint)") {
    for (cores <- Seq(4, 8, 16)) {
      val r = run(cores)
      assert(r.overflows == 0, s"cores=$cores overflows=${r.overflows}")
      assert(r.maxBufferBytes <= 4e9 + 1e-3)
    }
  }

  test("beats the static baseline on the same hardware") {
    val sky = run(4)
    val st = StaticBaseline.run(test, 4, 4e9, Covid.bitrateBytesPerSec,
                                Covid.cloudBytesPerSec, Covid.uplinkBytesPerSec)
    assert(sky.qualityPct > st.qualityPct + 0.02,
      s"sky=${sky.qualityPct} static=${st.qualityPct}")
  }

  test("does not exceed the ground-truth optimum") {
    val cores = 4
    val sky = run(cores)
    val budget = cores.toDouble * test.nSegments * test.segSec
    val opt = Optimum.assign(test, budget)
    assert(sky.qualityPct <= opt.qualityPct + 0.02,
      s"sky=${sky.qualityPct} opt=${opt.qualityPct}")
  }

  test("gets reasonably close to the optimum (paper §5.4 'astonishingly close')") {
    val cores = 8
    val sky = run(cores)
    val opt = Optimum.assign(test, cores.toDouble * test.nSegments * test.segSec)
    assert(sky.qualityPct > opt.qualityPct - 0.15,
      s"sky=${sky.qualityPct} opt=${opt.qualityPct}")
  }

  test("quality is monotone in machine size") {
    val q = Seq(4, 16, 60).map(run(_).qualityPct)
    assert(q(1) >= q(0) - 0.02, q.toString)
    assert(q(2) >= q(1) - 0.02, q.toString)
  }

  test("cloud budget is never exceeded and helps quality") {
    val withCloud = run(4, cloud = 2.0)
    assert(withCloud.cloudDollars <= 2.0 + 1e-9)
    val noCloud = run(4)
    assert(withCloud.qualityPct >= noCloud.qualityPct - 0.02,
      s"cloud=${withCloud.qualityPct} none=${noCloud.qualityPct}")
  }

  test("ablation variants stay within the full system's quality") {
    val full       = run(4, cloud = 2.0)
    val onlyBuffer = run(4, cloud = 2.0, useCloud = false)
    val onlyCloud  = run(4, cloud = 2.0, useBuffer = false)
    val neither    = run(4, cloud = 2.0, useBuffer = false, useCloud = false)
    for ((r, name) <- Seq((onlyBuffer, "buffer"), (onlyCloud, "cloud"), (neither, "none")))
      assert(r.qualityPct <= full.qualityPct + 0.03, s"$name=${r.qualityPct} full=${full.qualityPct}")
    assert(neither.qualityPct <= onlyBuffer.qualityPct + 0.03)
    assert(full.overflows == 0 && onlyBuffer.overflows == 0)
  }

  test("variant without buffer and cloud degenerates toward best static") {
    val neither = run(4, useBuffer = false, useCloud = false)
    val st = StaticBaseline.run(test, 4, 4e9, Covid.bitrateBytesPerSec,
                                Covid.cloudBytesPerSec, Covid.uplinkBytesPerSec)
    assert(neither.qualityPct >= st.qualityPct - 0.10,
      s"neither=${neither.qualityPct} static=${st.qualityPct}")
  }

  test("switcher chooses multiple configurations (content adaptivity)") {
    val r = run(4)
    assert(r.chosen.distinct.length >= 2)
  }
}
