package repro.store

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.video.Knobs._
import repro.video.Formats._
import repro.video.{CodecModel, VideoProfile}

/** Spark-backed segment store: the LMDB substitute (DESIGN.md).
  *
  * Ingestion transcodes each 8-second segment of the incoming stream into
  * every storage format of the configuration. Per the repro plan, format
  * selection/transcoding runs as a per-partition UDF: frames are partitioned
  * by (video, segment) and a `mapPartitions` pass applies the codec model to
  * each segment under each storage format, emitting one catalog row per
  * (segment, format) with its stored size and encode CPU cost.
  */
object SegmentStore {

  /** One frame row as consumed by the per-partition transcoder. */
  final case class Frame(video: String, segId: Long, frameIdx: Int, frame: Long,
                         isEvent: Boolean, difficulty: Double, motion: Double)

  /** One stored-segment catalog row. `sfId` indexes into the configuration's
    * storage-format list; sizes in bytes, encode cost in CPU-seconds.
    */
  final case class StoredSegment(video: String, segId: Long, sfId: Int,
                                 bytes: Double, encodeCpuSec: Double, nFrames: Int)

  /** Serializable snapshot of one storage format for executor-side use. */
  final case class SfSpec(sfId: Int, sf: StorageFormat)

  /** Ingest: transcode `frames` into each storage format.
    *
    * The per-segment motion level modulates encoded size and encode cost the
    * way content complexity does for x264 (heavier motion compresses worse
    * and encodes slower), so each segment's cost is derived from its actual
    * frame data, not just the dataset-level profile.
    */
  def ingest(spark: SparkSession, frames: DataFrame, sfs: Seq[StorageFormat],
             video: VideoProfile): Dataset[StoredSegment] = {
    import spark.implicits._
    val specs = sfs.zipWithIndex.map { case (sf, i) => SfSpec(i, sf) }
    val prof = video
    frames.as[Frame]
      .repartition(col("video"), col("segId"))
      .mapPartitions { it =>
        // Group this partition's frames by segment; a partition holds whole
        // segments because we repartitioned on (video, segId).
        it.toSeq.groupBy(f => (f.video, f.segId)).iterator.flatMap { case ((v, seg), fs) =>
          val segSec = fs.size.toDouble / repro.video.SynthVideo.Fps
          // mean motion of this segment relative to the dataset mean (1.0)
          val rel = if (fs.isEmpty) 1.0 else (fs.map(_.motion).sum / fs.size) / prof.motionFactor
          val relClamped = math.max(0.25, math.min(4.0, rel))
          specs.map { spec =>
            val perSec = CodecModel.storedBytesPerSec(spec.sf, prof)
            val bytes = spec.sf.coding match {
              case Raw => perSec * segSec // raw size is content-independent
              case _   => perSec * segSec * relClamped
            }
            val cores = CodecModel.ingestCores(spec.sf, prof) *
              (if (spec.sf.coding.isRaw) 1.0 else relClamped)
            StoredSegment(v, seg, spec.sfId, bytes, cores * segSec, fs.size)
          }
        }
      }
  }

  /** Total stored bytes per storage format id. */
  def bytesByFormat(stored: Dataset[StoredSegment]): Map[Int, Double] = {
    stored.groupBy("sfId").agg(sum("bytes") as "bytes")
      .collect().map(r => r.getInt(0) -> r.getDouble(1)).toMap
  }

  /** Total encode CPU-seconds per storage format id. */
  def encodeCpuByFormat(stored: Dataset[StoredSegment]): Map[Int, Double] = {
    stored.groupBy("sfId").agg(sum("encodeCpuSec") as "cpu")
      .collect().map(r => r.getInt(0) -> r.getDouble(1)).toMap
  }

  /** Apply an erosion plan: drop `deleteFraction` of segments (oldest-id
    * first, deterministically) for the given format. Returns the surviving
    * catalog.
    */
  def erode(stored: Dataset[StoredSegment], sfId: Int, deleteFraction: Double)
           (implicit spark: SparkSession): Dataset[StoredSegment] = {
    import spark.implicits._
    val ids = stored.filter(_.sfId == sfId).map(_.segId).distinct().collect().sorted
    val nDelete = math.round(ids.length * deleteFraction).toInt
    val doomed = ids.take(nDelete).toSet
    stored.filter(s => s.sfId != sfId || !doomed.contains(s.segId))
  }
}
