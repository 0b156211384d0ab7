package repro.store

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.video.Knobs._
import repro.video.Formats._
import repro.video.{CodecModel, SynthVideo, VideoProfile}

class SegmentStoreSpec extends SparkSpec {

  private val video = VideoProfile.jackson
  private val sfs = Seq(
    StorageFormat(Fidelity.full, Coding.slowestSmallest),
    StorageFormat(Fidelity.full.copy(sampling = FrameSampling.S1_30),
      Encoded(SpeedStep.Fast, KeyframeInterval(10))),
    StorageFormat(Fidelity(ImageQuality.Best, CropFactor.C100,
      Resolution.ten.find(_.height == 200).get, FrameSampling.S1), Raw),
  )

  private lazy val frames = SynthVideo.frames(spark, video, durationSec = 40).cache()
  private lazy val stored = SegmentStore.ingest(spark, frames, sfs, video).cache()

  test("ingest emits one catalog row per (segment, format)") {
    assert(stored.count() === 5L * sfs.size)
  }

  test("every segment is transcoded into every format") {
    val bySeg = stored.groupBy("segId").count().collect()
    assert(bySeg.forall(_.getLong(1) === sfs.size.toLong))
  }

  test("per-segment sizes are near the codec model's per-second size") {
    import spark.implicits._
    sfs.zipWithIndex.foreach { case (sf, i) =>
      val perSec = CodecModel.storedBytesPerSec(sf, video)
      val avgBytes = stored.filter(_.sfId == i).map(_.bytes).collect()
      avgBytes.foreach { b =>
        assert(b > perSec * 8 * 0.2 && b < perSec * 8 * 5.0,
          s"sf=$sf bytes=$b model=${perSec * 8}")
      }
      val mean = avgBytes.sum / avgBytes.length
      assert(math.abs(mean / (perSec * 8) - 1.0) < 0.35, s"sf=$sf mean=$mean")
    }
  }

  test("RAW segment size is content-independent") {
    import spark.implicits._
    val rawIdx = sfs.indexWhere(_.coding.isRaw)
    val sizes = stored.filter(_.sfId == rawIdx).map(_.bytes).collect().toSet
    assert(sizes.size === 1, s"raw sizes vary: $sizes")
  }

  test("encoded segment size varies with per-segment motion") {
    import spark.implicits._
    val sizes = stored.filter(_.sfId == 0).map(_.bytes).collect().toSet
    assert(sizes.size > 1, "encoded sizes should track per-segment motion")
  }

  test("aggregate size per format matches model within tolerance") {
    val totals = SegmentStore.bytesByFormat(stored)
    sfs.zipWithIndex.foreach { case (sf, i) =>
      val model = CodecModel.storedBytesPerSec(sf, video) * 40
      assert(math.abs(totals(i) / model - 1.0) < 0.35, s"sf=$sf got=${totals(i)} model=$model")
    }
  }

  test("encode CPU seconds track model ingest cores x duration") {
    val cpu = SegmentStore.encodeCpuByFormat(stored)
    sfs.zipWithIndex.foreach { case (sf, i) =>
      val model = CodecModel.ingestCores(sf, video) * 40
      assert(math.abs(cpu(i) / model - 1.0) < 0.35, s"sf=$sf got=${cpu(i)} model=$model")
    }
  }

  test("dashcam ingest stores more bytes than jackson for encoded formats") {
    val d = SynthVideo.frames(spark, VideoProfile.dashcam, 16)
    val j = SynthVideo.frames(spark, VideoProfile.jackson, 16)
    val sd = SegmentStore.bytesByFormat(SegmentStore.ingest(spark, d, sfs.take(1), VideoProfile.dashcam))
    val sj = SegmentStore.bytesByFormat(SegmentStore.ingest(spark, j, sfs.take(1), VideoProfile.jackson))
    assert(sd(0) > 2 * sj(0), s"dashcam=${sd(0)} jackson=${sj(0)}")
  }

  test("erode removes the requested fraction of a format's segments") {
    implicit val s = spark
    val after = SegmentStore.erode(stored, sfId = 0, deleteFraction = 0.4)
    import spark.implicits._
    assert(after.filter(_.sfId == 0).count() === 3) // 5 - 2
    assert(after.filter(_.sfId == 1).count() === 5) // untouched
  }

  test("erode deletes oldest segments first") {
    implicit val s = spark
    import spark.implicits._
    val after = SegmentStore.erode(stored, sfId = 0, deleteFraction = 0.4)
    val kept = after.filter(_.sfId == 0).map(_.segId).collect().sorted
    assert(kept.toSeq === Seq(2L, 3L, 4L))
  }

  test("erode with fraction 0 and 1 are no-op and full delete") {
    implicit val s = spark
    import spark.implicits._
    assert(SegmentStore.erode(stored, 0, 0.0).filter(_.sfId == 0).count() === 5)
    assert(SegmentStore.erode(stored, 0, 1.0).filter(_.sfId == 0).count() === 0)
  }

  test("catalog totals match DuckDB oracle aggregation") {
    val agg = stored.toDF().groupBy("sfId")
      .agg(count(lit(1)) as "n", round(sum("bytes"), 3) as "bytes")
    repro.Oracle.assertEquivalent(
      agg,
      "SELECT sfId, count(1) AS n, round(sum(CAST(bytes AS DOUBLE)), 3) AS bytes " +
        "FROM stored GROUP BY sfId",
      "stored" -> stored.toDF().select(col("sfId"), col("bytes")))
  }
}
