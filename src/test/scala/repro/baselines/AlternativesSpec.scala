package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.video.{CodecModel, VideoProfile}
import repro.video.OperatorModel
import repro.core.VStoreConfigurator

/** The §6.2 alternative configurations and the Figure 11 claims about them. */
class AlternativesSpec extends AnyFunSuite {

  private lazy val cfg = VStoreConfigurator.derive()

  test("the four configurations are VStore, 1->1, 1->N, N->N") {
    assert(Alternatives.all.map(_.name) === Vector("VStore", "1->1", "1->N", "N->N"))
  }

  test("1->1 and 1->N store exactly the golden format") {
    for (alt <- Seq(Alternatives.OneToOne, Alternatives.OneToN); v <- VideoProfile.all) {
      val bytes = Alternatives.storageBytesPerSec(alt, cfg, v)
      assert(bytes === CodecModel.storedBytesPerSec(cfg.golden, v))
    }
  }

  test("N->N stores one format per unique CF") {
    val sfs = Alternatives.nToNSfs(cfg)
    assert(sfs.size === cfg.uniqueCfs.size,
      s"${sfs.size} SFs for ${cfg.uniqueCfs.size} CFs")
  }

  test("N->N satisfies R1 for every consumer") {
    OperatorModel.consumers.foreach { c =>
      val stages = Alternatives.stages(Alternatives.NToN, cfg, Seq(c.op), c.targetAccuracy)
      stages.foreach(st => assert(st.sf.fidelity.richerOrEqual(st.cf)))
    }
  }

  test("VStore storage sits between golden-only and N->N (Fig 11b)") {
    VideoProfile.all.foreach { v =>
      val vs = Alternatives.storageBytesPerSec(Alternatives.VStoreCfg, cfg, v)
      val one = Alternatives.storageBytesPerSec(Alternatives.OneToOne, cfg, v)
      val nn = Alternatives.storageBytesPerSec(Alternatives.NToN, cfg, v)
      assert(one <= vs && vs <= nn, s"${v.name}: $one / $vs / $nn")
    }
  }

  test("VStore coalescing reduces storage ~2-5x vs N->N (Fig 11b)") {
    VideoProfile.all.foreach { v =>
      val vs = Alternatives.storageBytesPerSec(Alternatives.VStoreCfg, cfg, v)
      val nn = Alternatives.storageBytesPerSec(Alternatives.NToN, cfg, v)
      assert(nn / vs > 1.5 && nn / vs < 6.0, s"${v.name}: x${nn / vs}")
    }
  }

  test("VStore ingest is 30-50%+ lower than N->N (Fig 11c)") {
    VideoProfile.all.foreach { v =>
      val vs = Alternatives.ingestCores(Alternatives.VStoreCfg, cfg, v)
      val nn = Alternatives.ingestCores(Alternatives.NToN, cfg, v)
      assert(vs < nn * 0.7, s"${v.name}: vstore=$vs ntn=$nn")
    }
  }

  test("dashcam is the most expensive stream to store (Fig 11b)") {
    val byVideo = VideoProfile.all.map(v =>
      v.name -> Alternatives.storageBytesPerSec(Alternatives.VStoreCfg, cfg, v)).toMap
    assert(byVideo("dashcam") === byVideo.values.max)
  }

  test("1->1 query speed is fixed across accuracy targets") {
    val speeds = OperatorModel.accuracyLevels.map(a =>
      Alternatives.querySpeed(Alternatives.OneToOne, cfg, OperatorModel.queryB, a))
    assert(speeds.distinct.size === 1)
  }

  test("1->N is capped near the golden decode speed (Fig 11a)") {
    val goldenDecode = CodecModel.retrievalSpeed(cfg.golden, 30.0)
    OperatorModel.accuracyLevels.foreach { a =>
      val sp = Alternatives.querySpeed(Alternatives.OneToN, cfg, OperatorModel.queryB, a)
      assert(sp < goldenDecode * 3, s"a=$a speed=$sp golden=$goldenDecode")
    }
  }

  test("VStore outperforms 1->N by 3x-16x at low accuracy (Fig 11a)") {
    Seq(0.8, 0.7).foreach { a =>
      val vs = Alternatives.querySpeed(Alternatives.VStoreCfg, cfg, OperatorModel.queryB, a)
      val oneN = Alternatives.querySpeed(Alternatives.OneToN, cfg, OperatorModel.queryB, a)
      assert(vs / oneN > 3, s"a=$a x${vs / oneN}")
    }
  }

  test("VStore speeds up by orders of magnitude from 0.95 to 0.7 (Fig 11a)") {
    Seq(OperatorModel.queryA, OperatorModel.queryB).foreach { q =>
      val hi = Alternatives.querySpeed(Alternatives.VStoreCfg, cfg, q, 0.95)
      val lo = Alternatives.querySpeed(Alternatives.VStoreCfg, cfg, q, 0.70)
      assert(lo / hi > 10, s"elasticity x${lo / hi}")
    }
  }

  test("N->N matches VStore's query speed (same CFs, adequate SFs)") {
    OperatorModel.accuracyLevels.foreach { a =>
      val vs = Alternatives.querySpeed(Alternatives.VStoreCfg, cfg, OperatorModel.queryB, a)
      val nn = Alternatives.querySpeed(Alternatives.NToN, cfg, OperatorModel.queryB, a)
      assert(nn / vs > 0.8, s"a=$a vstore=$vs ntn=$nn")
    }
  }

  test("peak VStore query speed lands in the hundreds of x realtime (§6.2)") {
    val best = (for {
      q <- Seq(OperatorModel.queryA, OperatorModel.queryB)
      a <- OperatorModel.accuracyLevels
    } yield Alternatives.querySpeed(Alternatives.VStoreCfg, cfg, q, a)).max
    assert(best > 100, s"peak $best")
  }
}
