package repro.core

import repro.video.Knobs._
import repro.video.OperatorModel.{Consumer, Operator}

/** §4.2 — deriving consumption formats.
  *
  * For each consumer `<op, target-accuracy>` find the fidelity with adequate
  * accuracy and minimum consumption cost, profiling only a small subset of
  * the 600-option fidelity space:
  *
  *  1. fix image quality at its highest value (O2: quality does not affect
  *     consumption cost);
  *  2. partition the remaining 3-D space (crop x resolution x sampling)
  *     along the shortest dimension (crop, 3 values) into 2-D slices;
  *  3. in each (resolution x sampling) slice walk the accuracy boundary of
  *     the monotone accuracy surface (O1), profiling only boundary cells;
  *  4. take the boundary point with minimum consumption cost across slices,
  *     then lower image quality while accuracy stays adequate (cost is
  *     unchanged; storage shrinks opportunistically).
  *
  * Profiling cost: O((N_sampling + N_resolution) * N_crop + N_quality) runs
  * per consumer, vs N_s*N_r*N_c*N_q for exhaustive search.
  */
object ConsumptionConfig {

  /** Derived consumption format plus the accuracy/cost measured for it. */
  final case class Derived(consumer: Consumer, fidelity: Fidelity,
                           accuracy: Double, consumptionCost: Double) {
    def consumptionSpeed: Double = 1.0 / consumptionCost
  }

  /** Walk the accuracy boundary of one (resolution x sampling) slice.
    *
    * The grid is monotone: accuracy is non-decreasing in resolution and in
    * sampling. Starting from the richest corner (max resolution, max
    * sampling) we scan resolutions downward; for each resolution we walk
    * sampling leftward until accuracy turns inadequate. Because the boundary
    * column is non-increasing as resolution drops... (it is non-decreasing:
    * poorer resolution needs richer sampling or more) — concretely we keep a
    * cursor that only moves monotonically, so the walk profiles
    * O(N_res + N_samp) cells. Every *minimal adequate* cell met on the walk
    * is collected; the paper explores the entire boundary because the lowest
    * consumption cost may sit anywhere on it.
    */
  def boundaryCandidates(profiler: Profiler, op: Operator, target: Double,
                         quality: ImageQuality, crop: CropFactor): Vector[Fidelity] = {
    val resos = Resolution.ten.sortBy(-_.height) // richest first
    val samps = FrameSampling.all                 // poorest..richest
    var jRight = samps.length - 1                 // rightmost (richest) column
    val out = Vector.newBuilder[Fidelity]
    var j = jRight
    var stop = false
    for (res <- resos if !stop) {
      def fid(jj: Int) = Fidelity(quality, crop, res, samps(jj))
      // move left while adequate
      var lastAdequate = -1
      var cont = true
      while (cont) {
        val p = profiler.profileOp(op, fid(j))
        if (p.accuracy >= target) {
          lastAdequate = j
          if (j == 0) cont = false else j -= 1
        } else {
          cont = false
        }
      }
      if (lastAdequate >= 0) {
        out += fid(lastAdequate)
        // next (poorer) resolution needs >= this sampling; resume the cursor
        // from the boundary column
        j = lastAdequate
      } else {
        // even the current column is inadequate at this resolution; if the
        // richest column at this resolution is also inadequate, all poorer
        // resolutions are too (monotone in resolution) — but we only know
        // about column j. Check the richest column once; if inadequate, stop.
        if (j == jRight) stop = true
        else {
          val pRich = profiler.profileOp(op, fid(jRight))
          if (pRich.accuracy >= target) {
            // boundary moved right: find it by walking right from j+1
            var jj = j + 1
            var found = -1
            while (found < 0 && jj <= jRight) {
              val p = profiler.profileOp(op, fid(jj))
              if (p.accuracy >= target) found = jj else jj += 1
            }
            out += fid(found)
            j = found
          } else stop = true
        }
      }
    }
    out.result()
  }

  /** Derive the consumption format for one consumer. Falls back to the full
    * ingest fidelity when no option reaches the target (by construction the
    * full fidelity has accuracy 1.0 = ground truth).
    */
  def derive(profiler: Profiler, consumer: Consumer): Derived = {
    val op = consumer.op
    val target = consumer.targetAccuracy
    val qMax = ImageQuality.Best

    val candidates = CropFactor.all.flatMap { crop =>
      boundaryCandidates(profiler, op, target, qMax, crop)
    }
    val best3d: Fidelity =
      if (candidates.isEmpty) Fidelity.full
      else candidates.minBy(f => profiler.profileOp(op, f).consumptionCost)

    // Lower image quality to the minimum adequate (O2: no cost change).
    var chosen = best3d
    var qi = qMax.rank - 1
    var go = true
    while (go && qi >= 0) {
      val cand = chosen.copy(quality = ImageQuality.all(qi))
      val p = profiler.profileOp(op, cand)
      if (p.accuracy >= target) { chosen = cand; qi -= 1 } else go = false
    }

    val p = profiler.profileOp(op, chosen)
    Derived(consumer, chosen, p.accuracy, p.consumptionCost)
  }

  /** Derive consumption formats for a whole consumer set, sharing the
    * profiler (and so the memo) across accuracy levels of each operator.
    */
  def deriveAll(profiler: Profiler, consumers: Seq[Consumer]): Vector[Derived] =
    consumers.map(derive(profiler, _)).toVector

  /** Exhaustive derivation (the Figure 13 baseline): profile every fidelity
    * option and pick the cheapest adequate one.
    */
  def deriveExhaustive(profiler: Profiler, consumer: Consumer): Derived = {
    val op = consumer.op
    val all = Fidelity.space.map(f => f -> profiler.profileOp(op, f))
    val ok = all.filter(_._2.accuracy >= consumer.targetAccuracy)
    val (f, p) =
      if (ok.isEmpty) (Fidelity.full, profiler.profileOp(op, Fidelity.full))
      else ok.minBy(_._2.consumptionCost)
    Derived(consumer, f, p.accuracy, p.consumptionCost)
  }
}
