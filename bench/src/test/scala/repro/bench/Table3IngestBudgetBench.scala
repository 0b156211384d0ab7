package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.report.Reports

/** Table 3 — adaptation to a dropping ingestion budget.
  *
  * Paper: as the per-stream core budget falls 10 -> 1, VStore tunes coding
  * cheaper on individual storage formats (storage +9%), and below 2 cores
  * coalesces SF1+SF2 (storage x2). Our encode-cost scale differs (see
  * EXPERIMENTS.md), so the sweep extends to 0.5/0.25 cores where the same
  * coalescing fires.
  */
class Table3IngestBudgetBench extends AnyFunSuite {

  private val budgets: Seq[Option[Double]] =
    Seq(None, Some(10), Some(8), Some(4), Some(3), Some(2), Some(1), Some(0.5), Some(0.15))

  private lazy val rows = Reports.table3(budgets)

  test("print Table 3 (paper vs measured in EXPERIMENTS.md)") {
    Reports.table3Lines(rows).foreach(info(_))
  }

  test("every reachable budget is respected (>= 1 core)") {
    rows.foreach { r =>
      r.budgetCores.filter(_ >= 1).foreach { b =>
        if (r.ingestCores > b + 1e-6)
          fail(s"budget $b not met: ${r.ingestCores}")
      }
    }
  }

  test("sub-core budgets are best-effort: used cores never increase") {
    val used = rows.map(_.ingestCores)
    used.zip(used.tail).foreach { case (a, b) => assert(b <= a + 1e-9, used.toString) }
  }

  test("storage cost is non-decreasing as the budget drops (the tradeoff)") {
    val storage = rows.map(_.storageMBPerSec)
    storage.zip(storage.tail).foreach { case (a, b) =>
      assert(b >= a - 1e-9, s"storage fell: $storage")
    }
  }

  test("moderate budgets only tune coding; formats keep their count") {
    val base = rows.head
    rows.filter(_.budgetCores.exists(_ >= 1)).foreach { r =>
      assert(r.nSfs === base.nSfs, s"budget ${r.budgetCores}: ${r.nSfs} vs ${base.nSfs}")
    }
  }

  test("coding gets cheaper (faster steps) as the budget tightens") {
    def goldenRank(r: Reports.Table3Row): Int = {
      val c = r.codings.find(_._1 == "SFg").get._2
      Vector("250-slowest", "250-slow", "250-med", "250-fast", "250-fastest", "RAW").indexOf(c)
    }
    val ranks = rows.filter(_.budgetCores.forall(_ >= 0.5)).map(goldenRank)
    ranks.zip(ranks.tail).foreach { case (a, b) => assert(b >= a, ranks.toString) }
  }

  test("an extreme budget forces coalescing with a big storage jump (paper: x2)") {
    val base = rows.head
    val extreme = rows.last
    info(f"extreme budget: n=${extreme.nSfs} storage x${extreme.storageMBPerSec / base.storageMBPerSec}%.2f")
    assert(extreme.nSfs < base.nSfs, "expected SF coalescing at the extreme budget")
    assert(extreme.storageMBPerSec > base.storageMBPerSec * 1.5)
  }

  test("storage increase from gentle tuning is modest (paper: +9% over 10->2)") {
    val base = rows.head.storageMBPerSec
    val at1 = rows.find(_.budgetCores.contains(1.0)).get.storageMBPerSec
    val bump = at1 / base - 1
    info(f"storage bump at 1 core: +${bump * 100}%.0f%% (paper: +9%% at 2 cores, +123%% at 1)")
    assert(bump > 0 && bump < 1.0)
  }
}
