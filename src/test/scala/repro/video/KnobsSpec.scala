package repro.video

import org.scalatest.funsuite.AnyFunSuite
import repro.video.Knobs._

class KnobsSpec extends AnyFunSuite {

  test("fidelity space has 600 options (4 x 3 x 10 x 5)") {
    assert(Fidelity.space.size === 600)
    assert(Fidelity.space.distinct.size === 600)
  }

  test("coding space has 26 options (5 x 5 + RAW)") {
    assert(Coding.space.size === 26)
    assert(Coding.space.count(_.isRaw) === 1)
  }

  test("storage-format space F x C is ~15K as in the paper") {
    assert(Fidelity.space.size * Coding.space.size === 15600)
  }

  test("image quality has four ranks in richer order") {
    assert(ImageQuality.all.map(_.rank) === Vector(0, 1, 2, 3))
    assert(ImageQuality.all.map(_.qv) === ImageQuality.all.map(_.qv).sorted)
    assert(ImageQuality.all.map(_.crf) === Vector(50, 40, 23, 0))
  }

  test("crop factors are 50/75/100% of frame area") {
    assert(CropFactor.all.map(_.fraction) === Vector(0.5, 0.75, 1.0))
  }

  test("resolutions: ten rungs, 16:9-ish, sorted by height") {
    assert(Resolution.ten.size === 10)
    val hs = Resolution.ten.map(_.height)
    assert(hs === hs.sorted)
    assert(hs.head === 60 && hs.last === 720)
    Resolution.ten.foreach { r =>
      val ratio = r.width.toDouble / r.height
      assert(ratio > 1.6 && ratio < 1.85, s"$r aspect $ratio")
    }
  }

  test("resolutions cover every height in the paper's Table 2") {
    val hs = Resolution.ten.map(_.height).toSet
    for (h <- Seq(60, 100, 144, 180, 200, 360, 400, 540, 600, 720)) assert(hs.contains(h), s"${h}p")
  }

  test("frame sampling values are 1/30, 1/5, 1/2, 2/3, 1 of 30 fps") {
    assert(FrameSampling.all.map(_.fraction) === Vector(1.0 / 30, 0.2, 0.5, 2.0 / 3, 1.0))
    assert(FrameSampling.S1_30.fps === 1.0)
    assert(FrameSampling.S1.fps === 30.0)
  }

  test("keyframe intervals are 5, 10, 50, 100, 250") {
    assert(KeyframeInterval.all.map(_.frames) === Vector(5, 10, 50, 100, 250))
    assertThrows[IllegalArgumentException](KeyframeInterval(7))
  }

  test("speed steps are the five x264-preset-like rungs") {
    assert(SpeedStep.all.map(_.rank) === Vector(0, 1, 2, 3, 4))
    assert(SpeedStep.all.head === SpeedStep.Slowest && SpeedStep.all.last === SpeedStep.Fastest)
  }

  test("full fidelity is best-720p-1-100%") {
    assert(Fidelity.full.quality === ImageQuality.Best)
    assert(Fidelity.full.crop === CropFactor.C100)
    assert(Fidelity.full.resolution.height === 720)
    assert(Fidelity.full.sampling === FrameSampling.S1)
  }

  test("richerOrEqual is reflexive") {
    Fidelity.space.take(50).foreach(f => assert(f.richerOrEqual(f)))
  }

  test("richerThan is irreflexive and asymmetric") {
    val fs = Fidelity.space.take(40)
    for (a <- fs; b <- fs) {
      if (a == b) assert(!a.richerThan(b))
      if (a.richerThan(b)) assert(!b.richerThan(a), s"$a vs $b")
    }
  }

  test("richerThan is transitive on a sample") {
    val fs = Fidelity.space.grouped(23).map(_.head).toVector
    for (a <- fs; b <- fs if a.richerThan(b); c <- fs if b.richerThan(c))
      assert(a.richerThan(c), s"$a > $b > $c")
  }

  test("full fidelity is richer-or-equal to every option") {
    Fidelity.space.foreach(f => assert(Fidelity.full.richerOrEqual(f), f.toString))
  }

  test("richer-than does not exist between incomparable pairs (paper example)") {
    val a = Fidelity(ImageQuality.Good, CropFactor.C50, Resolution.ten.last, FrameSampling.S1_2)
    val b = Fidelity(ImageQuality.Bad, CropFactor.C100,
      Resolution.ten.find(_.height == 540).get, FrameSampling.S1)
    assert(!a.richerOrEqual(b) && !b.richerOrEqual(a))
  }

  test("Fidelity.max is the least upper bound knob-wise") {
    val fs = Fidelity.space.grouped(37).map(_.head).toVector
    for (a <- fs; b <- fs) {
      val m = Fidelity.max(a, b)
      assert(m.richerOrEqual(a) && m.richerOrEqual(b))
      // least: any common upper bound is richer-or-equal to m
      assert(m.quality.rank === math.max(a.quality.rank, b.quality.rank))
      assert(m.sampling.rank === math.max(a.sampling.rank, b.sampling.rank))
      assert(m.resolution.height === math.max(a.resolution.height, b.resolution.height))
      assert(m.crop.rank === math.max(a.crop.rank, b.crop.rank))
    }
  }

  test("Fidelity.max is commutative and idempotent") {
    val fs = Fidelity.space.grouped(41).map(_.head).toVector
    for (a <- fs; b <- fs) assert(Fidelity.max(a, b) === Fidelity.max(b, a))
    fs.foreach(f => assert(Fidelity.max(f, f) === f))
  }

  test("pixelsPerFrame and pixelRate account for crop and sampling") {
    val f = Fidelity(ImageQuality.Best, CropFactor.C50,
      Resolution.ten.find(_.height == 720).get, FrameSampling.S1_2)
    assert(f.pixelsPerFrame === 1280 * 720 * 0.5)
    assert(f.pixelRate === 1280 * 720 * 0.5 * 15.0)
  }

  test("rawBytesPerSec is 1.5 B/px at the sampled rate") {
    val f = Fidelity.full
    assert(math.abs(f.rawBytesPerSec - 1280 * 720 * 1.5 * 30) < 1e-6)
  }

  test("slowest/smallest coding is keyframe-250 slowest") {
    Coding.slowestSmallest match {
      case Encoded(step, kf) =>
        assert(step === SpeedStep.Slowest); assert(kf.frames === 250)
      case Raw => fail("golden coding must be encoded")
    }
  }

  test("coding toString shows kfInterval-step as in the paper's tables") {
    assert(Encoded(SpeedStep.Fast, KeyframeInterval(10)).toString === "10-fast")
    assert((Raw: Coding).toString === "RAW")
  }

  test("fidelity toString matches the paper's cell format") {
    assert(Fidelity.full.toString === "best-720p-1-100%")
  }
}
