package repro.query

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.video.Knobs._
import repro.video.Formats._
import repro.video.{CodecModel, SynthVideo, VideoProfile}
import repro.video.OperatorModel
import repro.video.OperatorModel.Consumer
import repro.core.VStoreConfigurator
import repro.query.QueryEngine.Stage

class QueryEngineSpec extends SparkSpec {

  private lazy val cfg = VStoreConfigurator.derive()
  private val video = VideoProfile.jackson
  private lazy val frames = SynthVideo.frames(spark, video, durationSec = 160).cache()
  // sparse samplers (1 fps) need a longer clip for the empirical F1 to
  // concentrate: 800 s -> ~240 events at 1 fps, sigma(F1) ~ 0.02
  private lazy val longFrames = SynthVideo.frames(spark, video, durationSec = 800).cache()

  private def stage(op: OperatorModel.Operator, acc: Double): Stage =
    Stage(op, cfg.cfOf(Consumer(op, acc)), cfg.sfOf(Consumer(op, acc)))

  test("stage construction enforces R1") {
    val cf = Fidelity.full
    val sfPoor = StorageFormat(
      Fidelity.full.copy(quality = ImageQuality.Good), Coding.slowestSmallest)
    assertThrows[IllegalArgumentException](Stage(OperatorModel.NN, cf, sfPoor))
  }

  test("analytic stage speed is min(retrieval, consumption)") {
    val st = stage(OperatorModel.License, 0.9)
    val retr = CodecModel.retrievalSpeed(st.sf, st.cf.sampling.fps)
    val cons = OperatorModel.License.consumptionSpeed(st.cf)
    assert(QueryEngine.analyticStageSpeed(st) === math.min(retr, cons))
  }

  test("analytic query speed: single stage equals stage speed") {
    val st = stage(OperatorModel.Motion, 0.9)
    val qs = QueryEngine.analyticQuerySpeed(Seq(st))
    assert(math.abs(qs - QueryEngine.analyticStageSpeed(st)) < 1e-9)
  }

  test("analytic query speed: selectivity discounts later stages") {
    val a = stage(OperatorModel.Motion, 0.9)
    val b = stage(OperatorModel.License, 0.9)
    val qs = QueryEngine.analyticQuerySpeed(Seq(a, b))
    val expect = 1.0 / (1.0 / QueryEngine.analyticStageSpeed(a) +
      OperatorModel.Motion.selectivity / QueryEngine.analyticStageSpeed(b))
    assert(math.abs(qs - expect) < 1e-9)
  }

  test("empirical F1 converges to the analytic accuracy (single stage)") {
    for ((op, acc) <- Seq((OperatorModel.Motion, 0.9), (OperatorModel.License, 0.8),
      (OperatorModel.SNN, 0.9))) {
      val st = stage(op, acc)
      val res = QueryEngine.runCascade(spark, longFrames, video, Seq(st))
      val expect = op.accuracy(st.cf, video)
      val got = res.perOp(op.name).f1
      assert(math.abs(got - expect) < 0.08, s"${op.name}@$acc: F1=$got analytic=$expect")
    }
  }

  test("empirical F1 meets the consumer's target accuracy") {
    val st = stage(OperatorModel.License, 0.8)
    val res = QueryEngine.runCascade(spark, longFrames, video, Seq(st))
    assert(res.perOp("License").f1 >= 0.8 - 0.06, res.perOp("License").f1.toString)
  }

  test("sampled frame counts follow the CF's sampling rate") {
    val st = stage(OperatorModel.License, 0.7) // sparse sampler
    val res = QueryEngine.runCascade(spark, frames, video, Seq(st))
    val everyN = math.max(1, math.round(SynthVideo.Fps / st.cf.sampling.fps).toInt)
    val expect = frames.count() / everyN
    assert(math.abs(res.perOp("License").sampled - expect) <= expect / 10 + 8)
  }

  test("no false positives by construction (precision 1 detector)") {
    val st = stage(OperatorModel.Motion, 0.8)
    val res = QueryEngine.runCascade(spark, frames, video, Seq(st))
    assert(res.perOp("Motion").fp === 0L)
  }

  test("cascade runs all stages and reports per-op results") {
    val stages = QueryEngine.stagesFor(OperatorModel.queryB, 0.8,
      c => cfg.cfOf(c), c => cfg.sfOf(c))
    val res = QueryEngine.runCascade(spark, frames, video, stages)
    assert(res.perOp.keySet === Set("Motion", "License", "OCR"))
    assert(res.querySpeed > 0)
  }

  test("empirical query speed is near the analytic model") {
    val stages = QueryEngine.stagesFor(OperatorModel.queryB, 0.8,
      c => cfg.cfOf(c), c => cfg.sfOf(c))
    val emp = QueryEngine.runCascade(spark, frames, video, stages).querySpeed
    val ana = QueryEngine.analyticQuerySpeed(stages)
    assert(emp / ana > 0.4 && emp / ana < 2.5, s"empirical=$emp analytic=$ana")
  }

  test("higher accuracy targets run slower (accuracy/cost tradeoff)") {
    def speed(acc: Double) = {
      val stages = QueryEngine.stagesFor(OperatorModel.queryB, acc,
        c => cfg.cfOf(c), c => cfg.sfOf(c))
      QueryEngine.analyticQuerySpeed(stages)
    }
    assert(speed(0.7) > speed(0.95), s"0.7=${speed(0.7)} 0.95=${speed(0.95)}")
  }

  test("decode time is charged at the storage format's retrieval speed") {
    val st = stage(OperatorModel.NN, 0.9)
    val res = QueryEngine.runCascade(spark, frames, video, Seq(st))
    val videoSec = frames.count() / 30.0
    val expect = videoSec / CodecModel.retrievalSpeed(st.sf, st.cf.sampling.fps)
    assert(math.abs(res.perOp("NN").decodeSec - expect) / expect < 0.05)
  }

  test("op time tracks per-frame cost times sampled frames") {
    val st = stage(OperatorModel.OCR, 0.9)
    val res = QueryEngine.runCascade(spark, frames, video, Seq(st))
    val r = res.perOp("OCR")
    val expect = r.sampled * OperatorModel.OCR.perFrameSec(st.cf.pixelsPerFrame)
    assert(math.abs(r.opSec - expect) / expect < 1e-6)
  }

  test("per-segment counters aggregate correctly vs DuckDB oracle") {
    import spark.implicits._
    val st = stage(OperatorModel.Motion, 0.9)
    // re-derive the per-segment rows exactly as runCascade does, then check
    // the F1 aggregation SQL against DuckDB
    val everyN = math.max(1, math.round(SynthVideo.Fps / st.cf.sampling.fps).toInt)
    val p = OperatorModel.Motion.detectProb(st.cf, video)
    val det = frames.as[repro.store.SegmentStore.Frame]
      .filter(f => f.frameIdx % everyN == 0)
      .map { f =>
        val detected = f.isEvent &&
          SynthVideo.u01Scala(f.video, f.frame, "detect-Motion") < p
        (f.segId, f.isEvent, detected)
      }.toDF("segId", "isEvent", "detected")
      .withColumn("tp", when(col("isEvent") && col("detected"), 1).otherwise(0))
      .withColumn("fn", when(col("isEvent") && !col("detected"), 1).otherwise(0))
    val agg = det.groupBy("segId").agg(sum("tp") as "tp", sum("fn") as "fn")
    repro.Oracle.assertEquivalent(
      agg,
      "SELECT segId, sum(CAST(tp AS INT)) AS tp, sum(CAST(fn AS INT)) AS fn " +
        "FROM det GROUP BY segId",
      "det" -> det.select("segId", "tp", "fn"))
  }

  test("1->N capping: reading golden caps a fast stage's speed") {
    val motionCf = cfg.cfOf(Consumer(OperatorModel.Motion, 0.8))
    val viaOwn = Stage(OperatorModel.Motion, motionCf, cfg.sfOf(Consumer(OperatorModel.Motion, 0.8)))
    val viaGolden = Stage(OperatorModel.Motion, motionCf, cfg.golden)
    assert(QueryEngine.analyticStageSpeed(viaGolden) < QueryEngine.analyticStageSpeed(viaOwn) / 10)
  }
}
