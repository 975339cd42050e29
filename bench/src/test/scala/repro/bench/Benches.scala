package repro.bench

import repro.SparkSpec
import repro.exp._

/** Benchmark suites — one per evaluation table of the paper. Each runs the
  * shared experiment harness at bench scale, prints the table the paper
  * reports (rows are transcribed into EXPERIMENTS.md next to the paper's
  * numbers), and asserts the structural invariants of the result.
  *
  * Scale via `BENCH_SCALE` (default 1.0): row counts multiply by it.
  */
trait BenchScale { self: SparkSpec =>
  private val scale = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)
  def rows(base: Long): Long = math.max(1000L, (base * scale).toLong)

  def banner(title: String, body: String): Unit =
    println(s"\n===== $title =====\n$body\n")
}

/** Fig 3 — in-database learning: scalar-SUM vs ring vs ring+factorized. */
class LearningBench extends SparkSpec with BenchScale {
  test("Fig 3: training a linear regression over joins") {
    val all = Seq("flight", "retailer").flatMap { ds =>
      val r = LearningExp.run(spark, ds, rows(300000))
      Methods.clearCaches(spark)
      r
    }
    banner("Fig 3 — in-database learning (train LR over join)", LearningExp.format(all))
    assert(all.size == 12) // 2 datasets × 2 attr modes × 3 approaches
    assert(all.forall(r => r.aggSecs > 0 && r.trainSecs >= 0))
    // The ring should never lose to the scalar-SUM baseline on aggregate time.
    for (ds <- Seq("flight", "retailer"); at <- Seq("continuous", "cont+categorical")) {
      val scalar = all.find(r => r.dataset == ds && r.attrs == at && r.approach == "scalar SUM").get
      val ring = all.find(r => r.dataset == ds && r.attrs == at && r.approach == "ring").get
      assert(ring.aggSecs < scalar.aggSecs * 1.5,
        s"$ds/$at: ring ${ring.aggSecs}s vs scalar ${scalar.aggSecs}s")
    }
  }
}

/** Fig 4 — single-table MICE cost vs missing rate. */
class SingleTableMiceBench extends SparkSpec with BenchScale {
  test("Fig 4: one MICE round over 7 incomplete attributes") {
    val rates = Seq(0.05, 0.1, 0.2, 0.4, 0.6, 0.8)
    val all = Seq("flight", "retailer").flatMap { ds =>
      val r = SingleTableExp.run(spark, ds, rows(800000), rates)
      Methods.clearCaches(spark)
      r
    }
    banner("Fig 4 — single-table imputation (per-round + preprocessing seconds)",
      SingleTableExp.format(all))
    assert(all.size == 2 * rates.size * 5)
    // Our ring implementations must beat the SystemDS simulator per round.
    for (ds <- Seq("flight", "retailer"); rate <- rates) {
      val ours = all.find(r => r.dataset == ds && r.rate == rate && r.method.startsWith("ours baseline")).get
      val sysds = all.find(r => r.dataset == ds && r.rate == rate && r.method.startsWith("SystemDS")).get
      assert(ours.roundSecs < sysds.roundSecs,
        s"$ds@$rate: ours ${ours.roundSecs}s vs SystemDS-sim ${sysds.roundSecs}s")
    }
  }
}

/** Fig 5 — Low implementation vs number of incomplete attributes. */
class AttrScalingBench extends SparkSpec with BenchScale {
  test("Fig 5: runtime breakdown vs #incomplete attributes") {
    val all = AttrScalingExp.run(spark, rows(300000))
    Methods.clearCaches(spark)
    banner("Fig 5 — Low implementation, varying #incomplete attributes", AttrScalingExp.format(all))
    assert(all.size == 12) // 2 rates × 6 attr counts
    // Runtime grows with the number of incomplete attributes.
    for (rate <- Seq(0.05, 0.20)) {
      val byN = all.filter(_.rate == rate).sortBy(_.nAttrs)
      assert(byN.last.roundSecs > byN.head.roundSecs,
        s"round time should grow with #attrs at rate $rate")
    }
  }
}

/** Fig 6 — normalized data: materialized join vs factorized evaluation. */
class NormalizedMiceBench extends SparkSpec with BenchScale {
  test("Fig 6: MICE over normalized data") {
    val rates = Seq(0.05, 0.2, 0.4)
    val all = Seq("retailer", "flight").flatMap { ds =>
      val r = NormalizedExp.run(spark, ds, rows(300000), rates)
      Methods.clearCaches(spark)
      r
    }
    banner("Fig 6 — imputation over normalized data", NormalizedExp.format(all))
    assert(all.size == 2 * rates.size * 2)
    assert(all.forall(_.roundSecs > 0))
  }
}

/** Fig 7 — quality + runtime on Air Quality (6% MCAR). */
class AirQualityBench extends SparkSpec with BenchScale {
  test("Fig 7: imputation quality on the Air Quality dataset") {
    val cells = QualityExp.run(spark, "airquality", rows(30000), Seq("mcar"), Seq(0.06),
      iterations = 5)
    Methods.clearCaches(spark)
    banner("Fig 7 — Air Quality: downstream R2/RMSE and imputation time",
      QualityExp.format(cells))
    assert(cells.size == 6)
    val mice = cells.find(_.method.startsWith("MICE ring")).get
    val mean = cells.find(_.method == "Mean").get
    assert(mice.rmse < mean.rmse, s"MICE ${mice.rmse} should beat mean ${mean.rmse}")
    assert(mice.r2 > mean.r2)
  }
}

/** Fig 8 — quality under MCAR/MAR/MNAR at varying missing rates. */
class PatternsQualityBench extends SparkSpec with BenchScale {
  test("Fig 8: quality across missing patterns and rates") {
    val patterns = Seq("mcar", "mar", "mnar")
    val rates = Seq(0.05, 0.2, 0.4, 0.8)
    val all = Seq("flight", "retailer").flatMap { ds =>
      val r = QualityExp.run(spark, ds, rows(15000), patterns, rates, iterations = 3)
      Methods.clearCaches(spark)
      r
    }
    banner("Fig 8 — quality (normalized downstream RMSE) by pattern × rate × method",
      QualityExp.format(all))
    assert(all.size == 2 * patterns.size * rates.size * 6)
    // Shape: at high MCAR rates, MICE beats mean imputation decisively.
    for (ds <- Seq("flight", "retailer")) {
      val mice = all.find(c => c.dataset == ds && c.pattern == "mcar" && c.rate == 0.4 &&
        c.method.startsWith("MICE ring")).get
      val mean = all.find(c => c.dataset == ds && c.pattern == "mcar" && c.rate == 0.4 &&
        c.method == "Mean").get
      assert(mice.rmse < mean.rmse, s"$ds: MICE ${mice.rmse} vs mean ${mean.rmse}")
    }
  }
}
