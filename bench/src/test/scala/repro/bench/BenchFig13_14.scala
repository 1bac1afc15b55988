package repro.bench

import repro.SparkSpec
import repro.harness.{Experiments, Report, TableFormat}

/** Fig. 13/14: bandwidth-estimation robustness. The planner is handed a
  * bandwidth matrix underestimated by 20%/50% (co-location, NIC
  * contention, switch contention patterns) while the execution is charged
  * on the true topology.
  *
  * Paper: even at 50% underestimation the change in response time stays
  * under 20%. (Fig. 13's estimation-accuracy measurement has no analogue
  * here — our §3.2 "benchmark" reads the simulated topology exactly, so
  * the interesting question is robustness to error, which this reproduces.)
  */
class BenchFig13_14 extends SparkSpec {

  test("Fig. 14: GRASP is robust to bandwidth underestimation") {
    val (base, cases) = Experiments.fig14(spark)
    val (t, h, rows) = Report.fig14(base, cases)
    TableFormat.emit(t, h, rows)

    cases.foreach { case (label, factor, r) =>
      val delta = math.abs(r.seconds - base.seconds) / base.seconds
      assert(delta <= 0.20, s"$label @${factor * 100}%: delta ${delta * 100}%")
    }
  }
}
