package repro.core

import repro.video.Knobs._
import repro.video.Formats
import repro.video.Formats._
import repro.video.OperatorModel.Consumer

/** §4.3 — deriving storage formats by iterative pairwise coalescing.
  *
  * Start from one storage format per unique consumption format (identical
  * fidelity, smallest-size coding whose retrieval speed still exceeds every
  * downstream consumer's consumption speed; RAW when even the cheapest
  * coding is too slow to decode) plus the *golden* format (knob-wise max
  * fidelity, slowest coding). Then repeatedly coalesce the pair that
  * maximally reduces ingestion cost without increasing storage cost. When an
  * ingestion budget is given and exceeded, first re-tune individual formats
  * to cheaper coding (always retrieval-safe: cheaper coding decodes faster),
  * then coalesce further — both at the expense of storage (paper Table 3).
  */
object StorageConfig {

  /** One working storage format and the consumption formats it serves. */
  final case class Node(sf: StorageFormat, cfs: Set[ConsumptionFormat])

  /** A derived storage configuration. */
  final case class Result(
      nodes: Vector[Node],
      rounds: Int,
  ) {
    def sfs: Vector[StorageFormat] = nodes.map(_.sf)
    /** CF -> storage format serving it. */
    def subscription: Map[ConsumptionFormat, StorageFormat] =
      (for (n <- nodes; cf <- n.cfs) yield cf -> n.sf).toMap
  }

  /** Demand of one consumption format: the fastest consumption speed among
    * its consumers (retrieval must beat it, R2) and its sampling rate.
    *
    * The demand is capped at the fastest physically attainable retrieval for
    * this CF — RAW at the CF's own fidelity — because no storage format can
    * retrieve faster than that; consumers faster than the disk are
    * necessarily retrieval-bound (the paper's SF3 row has the same property:
    * its retrieval ceiling is what such consumers get).
    */
  final case class Demand(cf: ConsumptionFormat, maxConsumerSpeed: Double)

  /** Cap a raw consumer speed at the best attainable retrieval for its CF. */
  def cappedDemand(profiler: Profiler, cf: ConsumptionFormat, speed: Double): Demand = {
    val ceiling = profiler.retrievalSpeed(
      StorageFormat(cf.fidelity, Raw), cf.fidelity.sampling.fps)
    Demand(cf, math.min(speed, ceiling))
  }

  /** Smallest-size coding for fidelity `f` whose retrieval speed beats every
    * demand; RAW if no encoded option suffices (R2 case b). Candidates are
    * ordered by stored size (profiled; the profiler memoizes), so the pick
    * minimizes storage under the speed constraint. Returns None when even
    * RAW cannot serve the demands.
    */
  def cheapestAdequateCoding(profiler: Profiler, f: Fidelity, demands: Seq[Demand]): Option[Coding] = {
    val encoded: Seq[Coding] =
      for (s <- SpeedStep.all; k <- KeyframeInterval.all) yield Encoded(s, k)
    val bySize = encoded.sortBy(c => profiler.profileSf(StorageFormat(f, c)).bytesPerSec)
    val candidates = bySize :+ (Raw: Coding)
    candidates.find { c =>
      val sf = StorageFormat(f, c)
      demands.forall(d => retrievalOk(profiler, sf, d))
    }
  }

  /** R2: retrieval at the demand's sampling rate must exceed its fastest
    * consumer's consumption speed.
    */
  def retrievalOk(profiler: Profiler, sf: StorageFormat, d: Demand): Boolean =
    profiler.retrievalSpeed(sf, d.cf.fidelity.sampling.fps) >= d.maxConsumerSpeed

  private def storageCost(profiler: Profiler, nodes: Seq[Node]): Double =
    nodes.map(n => profiler.profileSf(n.sf).bytesPerSec).sum

  private def ingestCost(profiler: Profiler, nodes: Seq[Node]): Double =
    nodes.map(n => profiler.profileSf(n.sf).ingestCores).sum

  /** Attempt to coalesce two nodes: knob-wise max fidelity, then the
    * smallest-size coding adequate for the union of demands. None if no
    * coding (not even RAW) can serve them all.
    */
  def coalescePair(profiler: Profiler, a: Node, b: Node,
                   demandOf: Map[ConsumptionFormat, Demand]): Option[Node] = {
    val f2 = Fidelity.max(a.sf.fidelity, b.sf.fidelity)
    val cfs = a.cfs ++ b.cfs
    val demands = cfs.toSeq.map(demandOf)
    cheapestAdequateCoding(profiler, f2, demands).map(c => Node(StorageFormat(f2, c), cfs))
  }

  /** Budget-mode coalescing: the merge only helps if it lowers ingest below
    * the pair's current cost, so among all *adequate* codings pick those
    * that do, and of them the smallest-size one (least storage damage).
    */
  def coalescePairUnderBudget(profiler: Profiler, a: Node, b: Node,
                              demandOf: Map[ConsumptionFormat, Demand],
                              rawForbidden: Fidelity => Boolean = _ => false): Option[Node] = {
    val f2 = Fidelity.max(a.sf.fidelity, b.sf.fidelity)
    val cfs = a.cfs ++ b.cfs
    val demands = cfs.toSeq.map(demandOf)
    val pairIngest = profiler.profileSf(a.sf).ingestCores + profiler.profileSf(b.sf).ingestCores
    val candidates = Coding.space.filter { c =>
      val sf = StorageFormat(f2, c)
      (!c.isRaw || !rawForbidden(f2)) &&
        demands.forall(d => retrievalOk(profiler, sf, d)) &&
        profiler.profileSf(sf).ingestCores < pairIngest - 1e-12
    }
    if (candidates.isEmpty) None
    else {
      val c = candidates.minBy(c2 => profiler.profileSf(StorageFormat(f2, c2)).bytesPerSec)
      Some(Node(StorageFormat(f2, c), cfs))
    }
  }

  /** Build the initial node set: one SF per unique CF + the golden format. */
  def initialNodes(profiler: Profiler, demands: Seq[Demand]): Vector[Node] = {
    val perCf = demands.map { d =>
      val coding = cheapestAdequateCoding(profiler, d.cf.fidelity, Seq(d))
        .getOrElse(Raw)
      Node(StorageFormat(d.cf.fidelity, coding), Set(d.cf))
    }
    val goldenSf = Formats.golden(demands.map(_.cf))
    // the golden node initially serves no CF; it exists as the erosion root
    perCf.toVector :+ Node(goldenSf, Set.empty)
  }

  /** Run greedy coalescing. `ingestBudgetCores` of None means "minimize
    * storage with no ingest constraint" (the paper's end-to-end setup).
    */
  def derive(profiler: Profiler, consumers: Seq[(Consumer, ConsumptionFormat, Double)],
             ingestBudgetCores: Option[Double] = None): Result = {
    // demand per unique CF: fastest consumer subscribing to it, capped at
    // the best physically attainable retrieval for that CF
    val demandOf: Map[ConsumptionFormat, Demand] =
      consumers.groupBy(_._2).map { case (cf, cs) =>
        cf -> cappedDemand(profiler, cf, cs.map(_._3).max)
      }
    var nodes = initialNodes(profiler, demandOf.values.toSeq.sortBy(_.cf.toString))
    var rounds = 0

    // Phase 1: coalesce while some pair reduces ingest without raising storage.
    var progress = true
    while (progress) {
      progress = false
      val cur = nodes
      val curStorage = storageCost(profiler, cur)
      val curIngest = ingestCost(profiler, cur)
      val best = bestMerge(profiler, cur, demandOf,
        keep = (st, in) => st <= curStorage + 1e-9 && in < curIngest - 1e-12,
        score = (st, in) => in)
      best.foreach { case (i, j, merged) =>
        nodes = applyMerge(cur, i, j, merged)
        rounds += 1
        progress = true
      }
    }

    // Phase 2: enforce the ingest budget — cheaper coding first, then
    // storage-increasing coalescing. The golden (knob-wise max) fidelity is
    // the erosion anchor (§4.4) and is never stored RAW: its raw footprint
    // would dwarf every other cost.
    val goldenFid = nodes.map(_.sf.fidelity).reduce(Fidelity.max)
    val noRawGolden: Fidelity => Boolean = f => f == goldenFid
    ingestBudgetCores.foreach { budget =>
      var guard = 0
      while (ingestCost(profiler, nodes) > budget && guard < 1000) {
        guard += 1
        val tuned = bestCodingTune(profiler, nodes, demandOf, noRawGolden)
        tuned match {
          case Some((idx, node)) => nodes = nodes.updated(idx, node)
          case None =>
            val cur = nodes
            val curIngest = ingestCost(profiler, cur)
            val best = bestMerge(profiler, cur, demandOf,
              keep = (_, in) => in < curIngest - 1e-12,
              score = (st, _) => st, // least resulting storage (least damage)
              merge = coalescePairUnderBudget(_, _, _, _, noRawGolden))
            best match {
              case Some((i, j, merged)) =>
                nodes = applyMerge(cur, i, j, merged); rounds += 1
              case None => guard = 1000 // nothing else reduces ingest
            }
        }
      }
    }

    Result(nodes, rounds)
  }

  /** Best merge among all pairs by `score` (higher is better) over the
    * resulting (storage, ingest), filtered by `keep`.
    */
  private def bestMerge(profiler: Profiler, nodes: Vector[Node],
                        demandOf: Map[ConsumptionFormat, Demand],
                        keep: (Double, Double) => Boolean,
                        score: (Double, Double) => Double,
                        merge: (Profiler, Node, Node, Map[ConsumptionFormat, Demand]) => Option[Node]
                          = coalescePair)
  : Option[(Int, Int, Node)] = {
    val curStorage = storageCost(profiler, nodes)
    val curIngest = ingestCost(profiler, nodes)
    val options = for {
      i <- nodes.indices
      j <- nodes.indices if j > i
      merged <- merge(profiler, nodes(i), nodes(j), demandOf).toSeq
      mergedStorage = curStorage -
        profiler.profileSf(nodes(i).sf).bytesPerSec -
        profiler.profileSf(nodes(j).sf).bytesPerSec +
        profiler.profileSf(merged.sf).bytesPerSec
      mergedIngest = curIngest -
        profiler.profileSf(nodes(i).sf).ingestCores -
        profiler.profileSf(nodes(j).sf).ingestCores +
        profiler.profileSf(merged.sf).ingestCores
      if keep(mergedStorage, mergedIngest)
    } yield (i, j, merged, mergedStorage, mergedIngest)
    if (options.isEmpty) None
    else {
      val (i, j, m, _, _) = options.minBy { case (_, _, _, st, in) => score(st, in) }
      Some((i, j, m))
    }
  }

  private def applyMerge(nodes: Vector[Node], i: Int, j: Int, merged: Node): Vector[Node] = {
    // keep the golden root: if one of the merged nodes was the knob-wise-max
    // golden and the merged fidelity equals it, the merged node inherits root
    // duty naturally (same fidelity).
    nodes.zipWithIndex.collect { case (n, k) if k != i && k != j => n } :+ merged
  }

  /** One coding-tuning move for the ingest budget: among all nodes, step one
    * node's coding to the next-cheaper (faster) option — speed-step first,
    * then RAW as the last resort — choosing the node where the move costs
    * the least extra storage per core saved. Cheaper coding decodes faster,
    * so retrieval adequacy is preserved by construction (checked anyway for
    * the RAW jump).
    */
  def bestCodingTune(profiler: Profiler, nodes: Vector[Node],
                     demandOf: Map[ConsumptionFormat, Demand],
                     rawForbidden: Fidelity => Boolean = _ => false): Option[(Int, Node)] = {
    val moves = nodes.zipWithIndex.flatMap { case (n, idx) =>
      nextCheaperCoding(n.sf.coding)
        .filter(c2 => !c2.isRaw || !rawForbidden(n.sf.fidelity))
        .flatMap { c2 =>
        val sf2 = StorageFormat(n.sf.fidelity, c2)
        val demands = n.cfs.toSeq.map(demandOf)
        if (!demands.forall(d => retrievalOk(profiler, sf2, d))) None
        else {
          val dIngest = profiler.profileSf(n.sf).ingestCores - profiler.profileSf(sf2).ingestCores
          val dStorage = profiler.profileSf(sf2).bytesPerSec - profiler.profileSf(n.sf).bytesPerSec
          if (dIngest <= 0) None
          else Some((idx, Node(sf2, n.cfs), dStorage / dIngest))
        }
      }
    }
    if (moves.isEmpty) None
    else {
      val (idx, node, _) = moves.minBy(_._3)
      Some((idx, node))
    }
  }

  /** The next cheaper-to-encode coding: bump the speed step; from `fastest`
    * fall through to RAW (encode bypass).
    */
  def nextCheaperCoding(c: Coding): Option[Coding] = c match {
    case Encoded(step, kf) =>
      SpeedStep.all.lift(step.rank + 1) match {
        case Some(next) => Some(Encoded(next, kf))
        case None       => Some(Raw)
      }
    case Raw => None
  }

  /** Exhaustive enumeration baseline (§6.4): try every partition of the CF
    * set, compute the optimal (minimum-storage) format per block, and return
    * the partition with minimum total storage among those meeting all
    * demands. Exponential (Bell number) — callers must keep the CF set small.
    */
  def deriveExhaustive(profiler: Profiler, consumers: Seq[(Consumer, ConsumptionFormat, Double)])
  : Result = {
    val demandOf: Map[ConsumptionFormat, Demand] =
      consumers.groupBy(_._2).map { case (cf, cs) =>
        cf -> cappedDemand(profiler, cf, cs.map(_._3).max)
      }
    val cfs = demandOf.keys.toVector.sortBy(_.toString)
    val goldenSf = Formats.golden(cfs)
    // The golden format always exists (erosion root); serving a block of CFs
    // *from* it is a legal configuration. Model it as a phantom partition
    // element pinning its block's fidelity to the golden fidelity.
    val goldenCf = ConsumptionFormat(goldenSf.fidelity)
    val phantomGolden = !demandOf.contains(goldenCf)
    val goldenDemand = Demand(goldenCf, 0.0)
    def demand(cf: ConsumptionFormat): Demand =
      if (cf == goldenCf && phantomGolden) goldenDemand else demandOf(cf)

    def blocks(items: List[ConsumptionFormat]): Iterator[List[List[ConsumptionFormat]]] =
      items match {
        case Nil => Iterator(Nil)
        case head :: tail =>
          blocks(tail).flatMap { part =>
            val withNew = (List(head) :: part) ::
              part.indices.map(i => part.updated(i, head :: part(i))).toList
            withNew.iterator
          }
      }

    val best = blocks((cfs :+ goldenCf).distinct.toList).flatMap { part =>
      val nodesOpt = part.map { block =>
        val f = block.map(_.fidelity).reduce(Fidelity.max)
        cheapestAdequateCoding(profiler, f, block.map(demand))
          .map(c => Node(StorageFormat(f, c),
            if (phantomGolden) block.toSet - goldenCf else block.toSet))
      }
      if (nodesOpt.exists(_.isEmpty)) None
      else Some {
        val nodes = nodesOpt.flatten.toVector
        nodes -> storageCost(profiler, nodes)
      }
    }.minBy(_._2)
    Result(best._1, rounds = 0)
  }
}
