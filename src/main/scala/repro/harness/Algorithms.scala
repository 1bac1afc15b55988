package repro.harness

import repro.core._

/** Runs the four §5.1.1 algorithms on a [[Scenario]] and reports the
  * quantities the paper's evaluation tables/figures are built from.
  */
object Algorithms {

  final case class RunResult(
      algo: String,
      seconds: Double,
      tuplesIntoDest: Long,
      phases: Int,
      planMillis: Long,
  )

  final case class AllResults(
      repart: RunResult,
      preaggRepart: RunResult,
      loom: Option[RunResult],
      grasp: RunResult,
  ) {
    def speedupOverPreagg(r: RunResult): Double = preaggRepart.seconds / r.seconds
    def toSeq: Seq[RunResult] = Seq(Some(repart), Some(preaggRepart), loom, Some(grasp)).flatten
  }

  private def timed[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1000000L)
  }

  /** Repart: raw tuples straight to the destination, no local aggregation. */
  def repart(sc: Scenario): RunResult = {
    val raw = sc.data.asPreAggregated(false)
    val (plan, ms) = timed(
      RepartPlanner.plan((v, l) => raw(v, l).rawCount, sc.nFragments, sc.mapping))
    val r = sc.simulator.run(plan, raw, sc.mapping)
    RunResult("Repart", r.totalSeconds, r.tuplesIntoDestinations, plan.numPhases, ms)
  }

  /** Preagg+Repart: local aggregation, then one bulk repartition phase. */
  def preaggRepart(sc: Scenario): RunResult = {
    val (plan, ms) = timed(RepartPlanner.plan(sc.stats, sc.mapping))
    val r = sc.simulator.run(plan, sc.data, sc.mapping)
    RunResult("Preagg+Repart", r.totalSeconds, r.tuplesIntoDestinations, plan.numPhases, ms)
  }

  /** LOOM with the accurate final result cardinality (its best case), for
    * all-to-one scenarios only.
    */
  def loom(sc: Scenario): Option[RunResult] = {
    if (sc.mapping.numPartitions != 1) None
    else {
      val rootCard = sc.data.globalCardinality(0)
      val (plan, ms) = timed(
        LoomPlanner.plan(sc.stats, sc.topo, sc.mapping(0), rootCard, sc.tupleBytes))
      val r = sc.simulator.run(plan, sc.data, sc.mapping)
      Some(RunResult("LOOM", r.totalSeconds, r.tuplesIntoDestinations, plan.numPhases, ms))
    }
  }

  /** GRASP, optionally with a perturbed bandwidth matrix handed to the
    * planner (§5.3.1) while the simulator charges the true topology.
    */
  def grasp(sc: Scenario, plannerBandwidth: Option[Array[Array[Double]]] = None): RunResult = {
    val bw = plannerBandwidth.getOrElse(sc.topo.bandwidthMatrix)
    val (plan, ms) = timed(
      new GraspPlanner(sc.stats, bw, sc.mapping, sc.tupleBytes).plan())
    val r = sc.simulator.run(plan, sc.data, sc.mapping)
    RunResult("GRASP", r.totalSeconds, r.tuplesIntoDestinations, plan.numPhases, ms)
  }

  def runAll(sc: Scenario): AllResults =
    AllResults(repart(sc), preaggRepart(sc), loom(sc), grasp(sc))
}
