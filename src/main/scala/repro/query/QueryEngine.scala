package repro.query

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.video.Knobs._
import repro.video.Formats._
import repro.video.{CodecModel, SynthVideo, VideoProfile}
import repro.video.OperatorModel.{Consumer, Operator}
import repro.store.SegmentStore.Frame

/** Query execution: a cascade of operators streamed over stored segments.
  *
  * Two layers:
  *  - [[analyticStageSpeed]] / [[analyticQuerySpeed]] — closed-form speeds
  *    from the cost models (what the configurator reasons about);
  *  - [[runCascade]] — an executable Spark job: frames are partitioned per
  *    segment and a `mapPartitions` pass per stage decodes (simulated decode
  *    cost), samples frames at the consumption format's rate, runs the
  *    per-frame detector, and emits per-segment counters. F1 and speeds are
  *    aggregated with DataFrame aggregations (oracle-checked in tests).
  *
  * Speed metric: video duration / processing delay, in multiples of
  * realtime; retrieval and consumption are pipelined, so a stage's speed is
  * min(retrievalSpeed, consumptionSpeed) and a query's wall time sums the
  * stage times over the fraction of video each stage scans (paper §2.2).
  */
object QueryEngine {

  /** One stage of a query: the operator, its consumption fidelity, and the
    * storage format it reads from.
    */
  final case class Stage(op: Operator, cf: Fidelity, sf: StorageFormat) {
    require(sf.fidelity.richerOrEqual(cf), s"R1 violated: $sf cannot serve CF<$cf>")
  }

  /** Pipelined speed of one stage, x realtime. */
  def analyticStageSpeed(stage: Stage): Double = {
    val retr = CodecModel.retrievalSpeed(stage.sf, stage.cf.sampling.fps)
    val cons = stage.op.consumptionSpeed(stage.cf)
    math.min(retr, cons)
  }

  /** Query speed over a cascade: stage i scans the fraction of video that
    * survived stages 0..i-1 (product of selectivities).
    */
  def analyticQuerySpeed(stages: Seq[Stage]): Double = {
    var fraction = 1.0
    var timePerVideoSec = 0.0
    stages.foreach { st =>
      timePerVideoSec += fraction / analyticStageSpeed(st)
      fraction *= st.op.selectivity
    }
    1.0 / timePerVideoSec
  }

  /** Per-stage, per-segment execution record from the Spark run. */
  final case class StageSegment(video: String, segId: Long, opName: String,
                                sampled: Long, tp: Long, fn: Long, fp: Long,
                                decodeSec: Double, opSec: Double)

  /** Aggregated result of one cascade run. */
  final case class CascadeResult(perOp: Map[String, OpResult], querySpeed: Double)
  final case class OpResult(f1: Double, sampled: Long, tp: Long, fn: Long, fp: Long,
                            decodeSec: Double, opSec: Double, stageSpeed: Double)

  /** Execute a cascade over `frames` (ingest-format frame table of one
    * video). Each stage runs as a mapPartitions pass over segment-partitioned
    * frames; stage i only charges time for the fraction of segments that
    * survived earlier stages (modelled by scaling with the cumulative
    * selectivity, as segment-level early exit).
    */
  def runCascade(spark: SparkSession, frames: DataFrame, video: VideoProfile,
                 stages: Seq[Stage]): CascadeResult = {
    import spark.implicits._
    val ds = frames.as[Frame].repartition(col("video"), col("segId"))
    val videoSec = frames.count().toDouble / SynthVideo.Fps

    var fraction = 1.0
    val opResults = Map.newBuilder[String, OpResult]
    var totalTimePerVideoSec = 0.0

    stages.foreach { stage =>
      val op = stage.op
      val cf = stage.cf
      val sf = stage.sf
      val prof = video
      val frac = fraction

      val everyN = math.max(1, math.round(SynthVideo.Fps / cf.sampling.fps).toInt)
      val segRows: Dataset[StageSegment] = ds.mapPartitions { it =>
        it.toSeq.groupBy(f => (f.video, f.segId)).iterator.map { case ((v, seg), fs) =>
          val segSec = fs.size.toDouble / SynthVideo.Fps
          // decode/retrieve this segment at the CF's sampling rate
          val decodeSec = segSec / CodecModel.retrievalSpeed(sf, cf.sampling.fps)
          val sampled = fs.filter(_.frameIdx % everyN == 0)
          val opSec = sampled.size * op.perFrameSec(cf.pixelsPerFrame)
          val p = op.detectProb(cf, prof)
          var tp = 0L; var fn = 0L
          sampled.foreach { f =>
            if (f.isEvent) {
              val u = SynthVideo.u01Scala(v, f.frame, s"detect-${op.name}")
              if (u < p) tp += 1 else fn += 1
            }
          }
          StageSegment(v, seg, op.name, sampled.size.toLong, tp, fn, 0L, decodeSec, opSec)
        }
      }

      val agg = segRows.groupBy("opName").agg(
        sum("sampled") as "sampled", sum("tp") as "tp", sum("fn") as "fn",
        sum("fp") as "fp", sum("decodeSec") as "decodeSec", sum("opSec") as "opSec",
      ).collect().head

      val (sampled, tp, fn, fp) = (agg.getLong(1), agg.getLong(2), agg.getLong(3), agg.getLong(4))
      val (decodeSec, opSec) = (agg.getDouble(5), agg.getDouble(6))
      val f1 = if (tp == 0) 0.0 else 2.0 * tp / (2.0 * tp + fn + fp)
      // pipelined: the stage's wall time is the max of decode and op time,
      // over the fraction of video it actually scans
      val stageWall = math.max(decodeSec, opSec) * frac
      val stageSpeed = videoSec / math.max(decodeSec, opSec)
      totalTimePerVideoSec += stageWall / videoSec
      opResults += op.name -> OpResult(f1, sampled, tp, fn, fp, decodeSec, opSec, stageSpeed)
      fraction *= op.selectivity
    }

    CascadeResult(opResults.result(), 1.0 / totalTimePerVideoSec)
  }

  /** Build the stages of a cascade from a consumer->CF and CF->SF mapping. */
  def stagesFor(cascade: Seq[Operator], accuracy: Double,
                cfOf: Consumer => Fidelity, sfOf: Consumer => StorageFormat): Seq[Stage] =
    cascade.map { op =>
      val c = Consumer(op, accuracy)
      Stage(op, cfOf(c), sfOf(c))
    }
}
