package repro.core

/** The repartitioning baselines of §5.1.1.
  *
  * Both "Repart" and "Preagg+Repart" ship every fragment's share of every
  * partition directly to the partition's destination in a single bulk phase.
  * The difference between the two is *what* is shipped — raw tuples vs. the
  * locally pre-aggregated result — which the simulator controls through its
  * `preAggregated` flag; the transfer schedule is identical.
  */
object RepartPlanner {

  /** One phase containing `s → M(l)` for every fragment share. The simulator
    * charges the destination's shared downlink for the concurrent transfers
    * (Eq. 9), which is exactly the repartitioning bottleneck the paper
    * describes ("the receiving link of the destination is the bottleneck").
    */
  def plan(cardinality: (Int, Int) => Long, nFragments: Int, mapping: Mapping): AggPlan = {
    val transfers = for {
      l <- (0 until mapping.numPartitions).toVector
      s <- 0 until nFragments
      if s != mapping(l) && cardinality(s, l) > 0
    } yield Transfer(s, mapping(l), l)
    AggPlan(Vector(Phase(transfers)))
  }

  /** Plan against a statistics snapshot (ignores minhash — repartitioning is
    * similarity-oblivious).
    */
  def plan(stats: PlannerState, mapping: Mapping): AggPlan =
    plan((s, l) => stats.cardinality(s, l), stats.nFragments, mapping)
}
