package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.video.Knobs._
import repro.video.Formats._
import repro.video.{CodecModel, VideoProfile}
import repro.video.OperatorModel
import repro.video.OperatorModel.Consumer

/** §4.3 coalescing: requirement checks R1-R4, greedy-vs-exhaustive
  * validation (§6.4), and budget adaptation (Table 3).
  */
class StorageConfigSpec extends AnyFunSuite {

  private def profiler() =
    new Profiler(new Profiler.AnalyticOpBackend(VideoProfile.jackson), VideoProfile.jackson)

  /** Consumers of query B at all accuracies — the paper's own exhaustive-
    * validation subset (we shrink further for Bell-number growth).
    */
  private def triplesFor(consumers: Seq[Consumer]) = {
    val cfg = VStoreConfigurator.derive(consumers)
    cfg.derived.map(d => (d.consumer, ConsumptionFormat(d.fidelity), d.consumptionSpeed))
  }

  private lazy val fullCfg = VStoreConfigurator.derive()

  test("R1: every CF's storage format has richer-or-equal fidelity") {
    fullCfg.storage.subscription.foreach { case (cf, sf) =>
      assert(sf.fidelity.richerOrEqual(cf.fidelity), s"$sf !>= $cf")
    }
  }

  test("R2: retrieval speed exceeds every consumer's attainable speed") {
    fullCfg.derived.foreach { d =>
      val sf = fullCfg.sfOf(d.consumer)
      val retr = CodecModel.retrievalSpeed(sf, d.fidelity.sampling.fps)
      // demand is capped at the fastest physically attainable retrieval for
      // the CF (RAW at its own fidelity) — faster consumers are disk-bound
      val ceiling = CodecModel.retrievalSpeed(StorageFormat(d.fidelity, Raw),
        d.fidelity.sampling.fps)
      val demand = math.min(d.consumptionSpeed, ceiling)
      assert(retr >= demand - 1e-6,
        s"${d.consumer}: retr=$retr < demand=$demand on $sf")
    }
  }

  test("R3: coalescing cuts the format count well below the CF count") {
    assert(fullCfg.sfs.size < fullCfg.uniqueCfs.size / 2,
      s"${fullCfg.sfs.size} SFs for ${fullCfg.uniqueCfs.size} CFs")
  }

  test("derived set contains a golden format covering everything") {
    val g = fullCfg.sfs.find(sf => fullCfg.sfs.forall(o => sf.fidelity.richerOrEqual(o.fidelity)))
    assert(g.isDefined, "no golden root among derived SFs")
    fullCfg.uniqueCfs.foreach(cf => assert(g.get.canServe(cf)))
  }

  test("the golden format keeps the slowest/smallest coding with no budget") {
    val g = fullCfg.sfs.find(_.fidelity == Fidelity.max(
      fullCfg.uniqueCfs.map(_.fidelity).reduce(Fidelity.max),
      fullCfg.uniqueCfs.head.fidelity)).get
    assert(g.coding === Coding.slowestSmallest)
  }

  test("every CF is subscribed to exactly one SF") {
    val subs = fullCfg.storage.subscription
    assert(subs.keySet === fullCfg.uniqueCfs.toSet)
  }

  test("paper shape: ~4 SFs including one RAW and the golden (Table 2b)") {
    assert(fullCfg.sfs.size >= 3 && fullCfg.sfs.size <= 6, s"${fullCfg.sfs.size}")
    assert(fullCfg.sfs.exists(_.coding.isRaw), "expect a RAW format for fast consumers")
    assert(fullCfg.sfs.exists(_.coding == Coding.slowestSmallest))
  }

  test("fast consumers land on RAW, slow consumers on encoded formats") {
    val fast = fullCfg.derived.filter(_.consumptionSpeed > 5000)
    val slow = fullCfg.derived.filter(_.consumptionSpeed < 50)
    fast.foreach(d => assert(fullCfg.sfOf(d.consumer).coding.isRaw, d.consumer.toString))
    slow.foreach(d => assert(!fullCfg.sfOf(d.consumer).coding.isRaw, d.consumer.toString))
  }

  test("cheapestAdequateCoding returns the smallest adequate option") {
    val p = profiler()
    val f = Fidelity.full
    val demand = StorageConfig.Demand(ConsumptionFormat(
      f.copy(sampling = FrameSampling.S1_30)), maxConsumerSpeed = 10.0)
    val c = StorageConfig.cheapestAdequateCoding(p, f, Seq(demand))
    assert(c.contains(Coding.slowestSmallest))
  }

  test("cheapestAdequateCoding escalates to RAW for very fast demands") {
    val p = profiler()
    val f200 = Fidelity(ImageQuality.Best, CropFactor.C100,
      Resolution.ten.find(_.height == 200).get, FrameSampling.S1_30)
    val demand = StorageConfig.Demand(ConsumptionFormat(f200), maxConsumerSpeed = 20000.0)
    val c = StorageConfig.cheapestAdequateCoding(p, f200, Seq(demand))
    assert(c.contains(Raw), s"got $c")
  }

  test("cheapestAdequateCoding returns None when nothing is fast enough") {
    val p = profiler()
    val f = Fidelity.full // raw 720p30 retrieval ~72x
    val demand = StorageConfig.Demand(ConsumptionFormat(f), maxConsumerSpeed = 1e7)
    assert(StorageConfig.cheapestAdequateCoding(p, f, Seq(demand)).isEmpty)
  }

  test("coalescePair takes the knob-wise max fidelity and unions CFs") {
    val p = profiler()
    val fa = Fidelity(ImageQuality.Good, CropFactor.C100,
      Resolution.ten.find(_.height == 540).get, FrameSampling.S1_30)
    val fb = Fidelity(ImageQuality.Best, CropFactor.C50,
      Resolution.ten.find(_.height == 200).get, FrameSampling.S1_2)
    val da = StorageConfig.Demand(ConsumptionFormat(fa), 50)
    val db = StorageConfig.Demand(ConsumptionFormat(fb), 100)
    val merged = StorageConfig.coalescePair(p,
      StorageConfig.Node(StorageFormat(fa, Coding.slowestSmallest), Set(da.cf)),
      StorageConfig.Node(StorageFormat(fb, Coding.slowestSmallest), Set(db.cf)),
      Map(da.cf -> da, db.cf -> db)).get
    assert(merged.sf.fidelity === Fidelity.max(fa, fb))
    assert(merged.cfs === Set(da.cf, db.cf))
  }

  test("greedy equals exhaustive enumeration on a small CF set (§6.4)") {
    // 8 consumers -> <= 8 CFs; Bell(8) = 4140 partitions is tractable
    val consumers = for {
      op <- Seq(OperatorModel.Motion, OperatorModel.License)
      a <- OperatorModel.accuracyLevels
    } yield Consumer(op, a)
    val triples = triplesFor(consumers)
    val pg = profiler()
    val greedy = StorageConfig.derive(pg, triples)
    val pe = profiler()
    val exhaustive = StorageConfig.deriveExhaustive(pe, triples)
    def cost(r: StorageConfig.Result) =
      r.sfs.map(sf => CodecModel.storedBytesPerSec(sf, VideoProfile.jackson)).sum
    assert(math.abs(cost(greedy) - cost(exhaustive)) <= cost(exhaustive) * 0.02 + 1e-6,
      s"greedy=${cost(greedy)} exhaustive=${cost(exhaustive)}\n" +
        s"greedy=${greedy.sfs}\nexhaustive=${exhaustive.sfs}")
  }

  test("greedy profiles a small fraction of the 15K format space (§6.4)") {
    val p = profiler()
    val triples = fullCfg.derived.map(d =>
      (d.consumer, ConsumptionFormat(d.fidelity), d.consumptionSpeed))
    StorageConfig.derive(p, triples)
    assert(p.sfRuns < 1500, s"${p.sfRuns} profiled")
    assert(p.sfRuns.toDouble / (Fidelity.space.size * Coding.space.size) < 0.1)
  }

  test("memoization hit rate during coalescing is high (§6.4: 92%)") {
    val p = profiler()
    val triples = fullCfg.derived.map(d =>
      (d.consumer, ConsumptionFormat(d.fidelity), d.consumptionSpeed))
    StorageConfig.derive(p, triples)
    val hitRate = 1.0 - p.sfRuns.toDouble / p.sfExamined
    assert(hitRate > 0.5, s"hit rate $hitRate (${p.sfRuns}/${p.sfExamined})")
  }

  test("ingest budget is respected when reachable (Table 3)") {
    Seq(8.0, 4.0, 2.0, 1.0).foreach { budget =>
      val cfg = VStoreConfigurator.derive(ingestBudgetCores = Some(budget))
      val cores = CodecModel.ingestCores(cfg.sfs, VideoProfile.jackson)
      assert(cores <= budget + 1e-6, s"budget=$budget used=$cores")
      // R1/R2 must still hold after adaptation
      cfg.derived.foreach { d =>
        val sf = cfg.sfOf(d.consumer)
        assert(sf.fidelity.richerOrEqual(d.fidelity))
        val ceiling = CodecModel.retrievalSpeed(StorageFormat(d.fidelity, Raw),
          d.fidelity.sampling.fps)
        assert(CodecModel.retrievalSpeed(sf, d.fidelity.sampling.fps) >=
          math.min(d.consumptionSpeed, ceiling) - 1e-6)
      }
    }
  }

  test("tighter ingest budgets raise storage cost (Table 3 tradeoff)") {
    def storage(b: Option[Double]) = {
      val cfg = VStoreConfigurator.derive(ingestBudgetCores = b)
      cfg.sfs.map(CodecModel.storedBytesPerSec(_, VideoProfile.jackson)).sum
    }
    val unbudgeted = storage(None)
    val tight = storage(Some(1.0))
    assert(tight >= unbudgeted, s"$tight < $unbudgeted")
  }

  test("budget adaptation tunes coding cheaper, never fidelity poorer") {
    val base = VStoreConfigurator.derive()
    val tight = VStoreConfigurator.derive(ingestBudgetCores = Some(1.0))
    // every consumer must still find a serving format at least as rich
    tight.derived.foreach { d =>
      assert(tight.sfOf(d.consumer).fidelity.richerOrEqual(d.fidelity))
    }
    // coding ranks move toward cheaper (higher rank) for the golden format
    def goldenStep(cfg: VStoreConfigurator.Configuration) =
      cfg.sfs.maxBy(_.fidelity.pixelRate).coding.rankForStorage
    assert(goldenStep(tight) >= goldenStep(base))
  }

  test("extreme budget forces coalescing below the unbudgeted format count") {
    val base = VStoreConfigurator.derive()
    val extreme = VStoreConfigurator.derive(ingestBudgetCores = Some(0.25))
    assert(extreme.sfs.size <= base.sfs.size)
  }

  test("nextCheaperCoding walks steps then RAW then stops") {
    var c: Option[Coding] = Some(Encoded(SpeedStep.Slowest, KeyframeInterval(250)))
    val seen = Vector.newBuilder[Coding]
    while (c.isDefined) { seen += c.get; c = StorageConfig.nextCheaperCoding(c.get) }
    val chain = seen.result()
    assert(chain.size === 6)
    assert(chain.last === Raw)
    assert(chain.init.map(_.rankForStorage) === chain.init.map(_.rankForStorage).sorted)
  }

  test("initialNodes has one SF per CF plus the golden") {
    val p = profiler()
    val triples = triplesFor(Seq(Consumer(OperatorModel.NN, 0.9), Consumer(OperatorModel.NN, 0.8)))
    val demands = triples.groupBy(_._2).map { case (cf, ts) =>
      StorageConfig.Demand(cf, ts.map(_._3).max)
    }.toSeq
    val nodes = StorageConfig.initialNodes(p, demands)
    assert(nodes.size === demands.size + 1)
    assert(nodes.count(_.cfs.isEmpty) === 1) // the golden node
  }

  test("subscription covers exactly the input CFs") {
    val subs = fullCfg.storage.subscription
    subs.values.foreach(sf => assert(fullCfg.sfs.contains(sf)))
  }
}
