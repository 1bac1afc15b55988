package repro.bench

import repro.SparkSpec
import repro.harness.{Experiments, Report, TableFormat}

/** Fig. 16: scale-out from 28 to 112 fragments (14 per machine).
  *
  * Paper: all-to-one speedup grows with the fragment count (41x over
  * Preagg+Repart and 7.5x over LOOM at 112) because repartitioning
  * bottlenecks on the destination's receiving link; all-to-all speedup
  * peaks near 56 fragments and then declines as GRASP's planning cost
  * grows. Reproduced shape: monotone all-to-one growth; the all-to-all
  * planning wall-clock blows up super-linearly (reported in the table),
  * which is the paper's stated cause of the decline.
  */
class BenchFig16 extends SparkSpec {

  test("Fig. 16: all-to-one speedup grows with fragments; planning cost grows all-to-all") {
    val results = Experiments.fig16(spark)
    val (t, h, rows) = Report.fig16(results)
    TableFormat.emit(t, h, rows)

    val oneSpeedups = results.map { case (_, one, _) => one.speedupOverPreagg(one.grasp) }
    oneSpeedups.sliding(2).foreach { case Seq(a, b) =>
      assert(b >= a - 0.2, s"all-to-one speedup not growing: $oneSpeedups")
    }
    assert(oneSpeedups.last >= oneSpeedups.head + 1.0, s"no scale-out benefit: $oneSpeedups")
    assert(oneSpeedups.last >= 6.0, s"GRASP at 112 fragments: ${oneSpeedups.last}")

    results.foreach { case (n, _, all) =>
      assert(all.speedupOverPreagg(all.grasp) >= 3.0, s"all-to-all GRASP at n=$n")
    }
    // The planning cost phenomenon behind the paper's Fig. 16b decline.
    val planTimes = results.map { case (_, _, all) => all.grasp.planMillis }
    assert(planTimes.last > planTimes.head * 10,
      s"all-to-all planning cost should grow super-linearly: $planTimes")
  }
}
