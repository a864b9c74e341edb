package repro.core

import org.apache.spark.sql.SparkSession
import repro.sim._
import repro.workload.{ConfigProfile, Workload}

/** Skyscraper hyperparameters (paper Appendix I defaults). */
final case class Hyper(
    nCategories: Int = 4,
    forecast: ForecastSpec = ForecastSpec(),
    preSampleSize: Int = 2000,
    nSearch: Int = 5,
    maxK: Int = 8,
    categorySampleFrac: Double = 0.05,
    seed: Long = 7,
)

/** Everything the offline phase produces (paper §3 / Fig. 2 left). */
final case class SkyscraperModel(
    workload: Workload,
    configs: Vector[ConfigProfile],
    cats: ContentCategories,
    forecaster: Forecaster,
    trainCats: Array[Int],
    costHat: Array[Array[Double]], // ĉ(c)(k) per-segment core·s
    qualHat: Array[Array[Double]], // q̂(c)(k) expected application quality
    hyper: Hyper,
)

/** Offline fitting and online ingestion of Skyscraper (paper §3–4). */
object Skyscraper {

  /** Run the offline phase on `trainDays` of history and build the traces.
    * Returns (model, trainTrace, testTrace); both traces share the filtered
    * configuration set K.
    */
  def fitAndTrace(spark: SparkSession, w: Workload, hyper: Hyper = Hyper(),
                  trainDays: Int = -1, testDays: Int = -1)
      : (SkyscraperModel, SegmentTrace, SegmentTrace) = {
    val trD = if (trainDays > 0) trainDays else w.trainDays
    val teD = if (testDays > 0) testDays else w.testDays

    // 1. Filter knob configurations on a content-diverse pre-sample.
    val pre = preSample(spark, w, trD, hyper.preSampleSize, hyper.seed)
    val k   = Pareto.filterConfigs(w, pre, hyper.nSearch, hyper.maxK)

    // 2. One quality/cost matrix over train+test for the filtered K (the
    //    data-parallel Spark pass).
    val full = QualityMatrix.trace(spark, w, trD + teD, k, hyper.seed)
    val split = full.dayStart(trD)
    val train = full.slice(0, split)
    val test  = full.slice(split, full.nSegments)

    val model = fitFromTrace(w, k, train, hyper)
    (model, train, test)
  }

  /** Driver-side offline phase given the training trace. */
  def fitFromTrace(w: Workload, k: Vector[ConfigProfile], train: SegmentTrace,
                   hyper: Hyper): SkyscraperModel = {
    val cats      = ContentCategories.fit(train, hyper.nCategories,
                                          hyper.categorySampleFrac, hyper.seed)
    val trainCats = ContentCategories.assignOnline(cats, train)
    val costHat   = meanByCategory(train.cost, trainCats, cats.n, train)
    val qualHat   = meanByCategory(train.qual, trainCats, cats.n, train)
    val forecaster = new Forecaster(hyper.forecast, cats.n, train.segSec, hyper.seed)
    forecaster.fit(trainCats)
    SkyscraperModel(w, k, cats, forecaster, trainCats, costHat, qualHat, hyper)
  }

  /** Diverse pre-sample of segments for the config filter (Appendix A.1). */
  def preSample(spark: SparkSession, w: Workload, days: Int, size: Int,
                seed: Long): Seq[Pareto.Seg] = {
    val segs  = w.stream(spark, days, seed)
    val total = days.toLong * 86400L / w.segSec.toLong
    val stride = math.max(1L, total / size)
    segs.filter(org.apache.spark.sql.functions.pmod(
        org.apache.spark.sql.functions.col("segId"),
        org.apache.spark.sql.functions.lit(stride)) === 0L)
      .select("segId", "difficulty", "load", "regime")
      .collect()
      .map(r => Pareto.Seg(r.getAs[Long]("segId"), r.getAs[Double]("difficulty"),
                           r.getAs[Double]("load"), r.getAs[Int]("regime")))
      .toSeq
  }

  /** Per-category column means of a (segment × config) matrix — yields
    * ĉ(c)(k) from costs and q̂(c)(k) from qualities (paper §3.2's cluster
    * centers, computed on the application-quality channel).
    */
  def meanByCategory(matrix: Array[Array[Double]], catOf: Array[Int], nCats: Int,
                     trace: SegmentTrace): Array[Array[Double]] = {
    val nK = trace.nConfigs
    val sums   = Array.ofDim[Double](nCats, nK)
    val counts = Array.ofDim[Double](nCats)
    var i = 0
    while (i < trace.nSegments) {
      val c = catOf(i)
      var k = 0
      while (k < nK) { sums(c)(k) += matrix(i)(k); k += 1 }
      counts(c) += 1
      i += 1
    }
    Array.tabulate(nCats, nK) { (c, k) =>
      if (counts(c) > 0) sums(c)(k) / counts(c)
      else matrix.iterator.map(_(k)).sum / trace.nSegments
    }
  }

  /** The online controller: periodic predictive planning + reactive
    * switching (paper §4). `useBuffer=false` / `useCloud=false` implement
    * the §5.4 ablation variants.
    */
  final class OnlineController(model: SkyscraperModel, cores: Int, nSegs: Int,
                               cloudBudget: Double, cloudPricePerCoreSec: Double,
                               useCloud: Boolean) extends Controller {
    private val segSec      = segLenOf(model)
    private val horizonSegs =
      math.max(1, (model.hyper.forecast.horizonDays * 86400.0 / segSec).toInt)
    private val placements =
      if (useCloud) Placement.grid else Vector(Placement(0.0))
    val switcher = new KnobSwitcher(model.cats, model.qualHat, placements)
    private val observed = scala.collection.mutable.ArrayBuffer[Int]()
    var plansComputed = 0

    def choose(probe: Probe, segIdx: Int): Decision = {
      if (segIdx % horizonSegs == 0) replan(probe, segIdx)
      switcher.choose(probe)
    }

    override def observe(segIdx: Int, cfgIdx: Int, qual: Double, report: Double): Unit = {
      switcher.observe(cfgIdx, report)
      observed += switcher.currentCategory
    }

    private def replan(probe: Probe, segIdx: Int): Unit = {
      val history = model.trainCats ++ observed
      val r = model.forecaster.predict(history, history.length)
      // Ration the remaining cloud credits over the remaining intervals.
      val segsLeft = math.max(1, nSegs - segIdx)
      val intervalSegs = math.min(horizonSegs, segsLeft)
      val cloudThisInterval =
        if (useCloud && cloudBudget > 0)
          math.max(0.0, probe.cloudRemaining) * intervalSegs / segsLeft
        else 0.0
      val cloudCoreSecPerSeg =
        if (cloudThisInterval > 0)
          cloudThisInterval / cloudPricePerCoreSec / intervalSegs
        else 0.0
      val budgetPerSeg = cores * segSec + cloudCoreSecPerSeg
      val plan = KnobPlanner.plan(model.qualHat, model.costHat, r, budgetPerSeg)
      switcher.setPlan(plan)
      plansComputed += 1
    }
  }

  /** q̂(c)(k): the per-category expected application quality. */
  def qualHat(model: SkyscraperModel): Array[Array[Double]] = model.qualHat

  private def segLenOf(model: SkyscraperModel): Double = model.workload.segSec

  /** Simulate Skyscraper ingesting `test` on `cores` with the given buffer
    * and cloud budget. `useBuffer=false` shrinks the buffer to one segment
    * (variant 1c "only cloud"); `useCloud=false` zeroes the cloud
    * (variant 1b "only buffering"); both false reproduce variant 1a.
    */
  def run(model: SkyscraperModel, test: SegmentTrace, cores: Int,
          bufferBytes: Double = 4e9, cloudBudget: Double = 0.0,
          cloudRatio: Double = Machines.cloudRatio,
          useBuffer: Boolean = true, useCloud: Boolean = true): RunResult = {
    val w = model.workload
    val price = Machines.cloudPerCoreSec(cloudRatio)
    val effBuffer = if (useBuffer) bufferBytes
                    else w.bitrateBytesPerSec * w.segSec * 2 // ≈ no slack
    val effCloud  = if (useCloud) cloudBudget else 0.0
    val sim = new ClusterSim(test, cores, effBuffer, effCloud, price,
      w.bitrateBytesPerSec, w.cloudBytesPerSec, w.uplinkBytesPerSec)
    val ctrl = new OnlineController(model, cores, test.nSegments, effCloud, price, useCloud)
    sim.run(ctrl)
  }
}
