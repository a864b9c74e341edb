package repro.video

import org.apache.spark.sql.functions._
import repro.SparkSpec

class VideoSynthSpec extends SparkSpec {

  private val spec = StreamSpec(name = "test", days = 2, segSec = 4.0, seed = 3)

  test("segment count matches days / segSec") {
    val df = VideoSynth.segments(spark, spec)
    assert(df.count() == 2L * 86400 / 4)
  }

  test("schema and value ranges") {
    val df = VideoSynth.segments(spark, spec)
    assert(df.columns.toSet == Set("segId", "t", "day", "hour", "regime", "difficulty", "load"))
    val bad = df.where(
      col("difficulty") < 0 || col("difficulty") > 1 ||
      col("hour") < 0 || col("hour") >= 24 ||
      col("regime") < 0 || col("regime") > 3 ||
      col("load") =!= 1.0).count()
    assert(bad == 0)
  }

  test("generation is deterministic in the seed") {
    val a = VideoSynth.segments(spark, spec).agg(sum("difficulty")).collect()(0).getDouble(0)
    val b = VideoSynth.segments(spark, spec).agg(sum("difficulty")).collect()(0).getDouble(0)
    assert(a == b)
    val c = VideoSynth.segments(spark, spec.copy(seed = 99))
      .agg(sum("difficulty")).collect()(0).getDouble(0)
    assert(a != c)
  }

  test("diurnal pattern: daytime harder than night") {
    val df = VideoSynth.segments(spark, spec)
    val day = df.where(col("hour") >= 10 && col("hour") <= 16)
      .agg(avg("difficulty")).collect()(0).getDouble(0)
    val night = df.where(col("hour") >= 0 && col("hour") <= 4)
      .agg(avg("difficulty")).collect()(0).getDouble(0)
    assert(day > night + 0.2, s"day=$day night=$night")
  }

  test("busy regimes are more frequent during the day") {
    val df = VideoSynth.segments(spark, spec)
    def busyFrac(lo: Int, hi: Int): Double = {
      val in = df.where(col("hour") >= lo && col("hour") <= hi)
      in.where(col("regime") >= 2).count().toDouble / in.count()
    }
    assert(busyFrac(10, 16) > busyFrac(0, 4) + 0.2)
  }

  test("regimes dwell for ~dwellSec, not per-segment") {
    val rows = VideoSynth.segments(spark, spec)
      .orderBy("segId").select("regime").limit(5000)
      .collect().map(_.getInt(0))
    val changes = rows.sliding(2).count { case Array(a, b) => a != b }
    // 5000 segments of 4 s = 20000 s; dwell 40 s → ≈ 500 block boundaries.
    assert(changes < 1200, s"changes=$changes")
    assert(changes > 50, s"changes=$changes")
  }

  test("day amplitudes are deterministic, bounded, and weekend-damped") {
    val longSpec = spec.copy(days = 14)
    val a = VideoSynth.dayAmplitudes(longSpec)
    val b = VideoSynth.dayAmplitudes(longSpec)
    assert(a.sameElements(b))
    assert(a.forall(v => v > 0.3 && v < 1.5))
    // Weekend days (5, 6 mod 7) carry the damping factor.
    val weekdayMean = a.indices.filter(d => d % 7 < 5).map(a(_)).sum /
      a.indices.count(_ % 7 < 5)
    val weekendMean = a.indices.filter(d => d % 7 >= 5).map(a(_)).sum /
      a.indices.count(_ % 7 >= 5)
    assert(weekendMean < weekdayMean)
  }

  test("MOSEI-HIGH load spikes reach the cap and are short") {
    val ls = LoadSpec(spikeHigh = true, highPeriodSec = 10800, highLenSec = 420)
    val df = VideoSynth.segments(spark, spec.copy(loadSpec = Some(ls)))
    val atCap = df.where(col("load") === 62.0).count()
    val total = df.count()
    assert(atCap > 0)
    assert(atCap.toDouble / total < 0.10, s"cap fraction ${atCap.toDouble / total}")
    val inWindow = df.where(pmod(col("t"), lit(10800.0)) < 420 && col("load") === 62.0).count()
    assert(inWindow == atCap, "spikes only inside the periodic windows")
  }

  test("MOSEI-LONG plateau raises load for its whole window") {
    val ls = LoadSpec(spikeLongFromSec = 3600, spikeLongToSec = 3600 + 8 * 3600,
                      longExtra = 30)
    val df = VideoSynth.segments(spark, spec.copy(loadSpec = Some(ls)))
    val in  = df.where(col("t") >= 3600 && col("t") < 3600 + 8 * 3600)
      .agg(avg("load")).collect()(0).getDouble(0)
    val out = df.where(col("t") >= 12 * 3600 && col("t") < 20 * 3600)
      .agg(avg("load")).collect()(0).getDouble(0)
    assert(in > out + 15, s"in=$in out=$out")
  }

  test("load is always within [1, maxStreams]") {
    val ls = LoadSpec(spikeHigh = true)
    val df = VideoSynth.segments(spark, spec.copy(loadSpec = Some(ls)))
    assert(df.where(col("load") < 1 || col("load") > 62).count() == 0)
  }
}
