package repro.core

/** Plan representation from §2 of the paper.
  *
  * An aggregation plan `P = {P_1 … P_n}` is a sequence of phases executed in
  * serial order; each phase is a set of concurrent transfers `s → t` of one
  * data partition `l`. In the all-to-one special case there is a single
  * partition (`l = 0`) whose destination is the coordinator fragment.
  */
final case class Transfer(src: Int, dst: Int, partition: Int) {
  require(src != dst, s"self transfer $src -> $dst")
  override def toString: String = s"$src->$dst[l=$partition]"
}

final case class Phase(transfers: Vector[Transfer]) {
  def size: Int = transfers.size

  /** §3.5 invariant for GRASP-produced phases: one node sends to at most one
    * node and receives from at most one node; no node both sends and
    * receives the same partition. Baseline plans (Repart, LOOM levels) may
    * violate the receive side on purpose — the simulator charges shared
    * links for it (Eq. 9).
    */
  def sendersDistinct: Boolean = transfers.map(_.src).distinct.size == transfers.size
  def receiversDistinct: Boolean = transfers.map(_.dst).distinct.size == transfers.size
}

final case class AggPlan(phases: Vector[Phase]) {
  def numPhases: Int = phases.size
  def numTransfers: Int = phases.iterator.map(_.size).sum
  def transfers: Iterator[Transfer] = phases.iterator.flatMap(_.transfers)
}

/** The all-to-all destination mapping `M : L → V_C` (§2.2).
  *
  * `destinationOf(l)` is the fragment that must hold partition `l` when the
  * aggregation completes. All-to-one is the special case of a single
  * partition (§4.3.3).
  */
final case class Mapping(destinationOf: Vector[Int]) {
  def numPartitions: Int = destinationOf.size
  def apply(l: Int): Int = destinationOf(l)
}

object Mapping {
  /** All-to-one: one partition, aggregated at `dest`. */
  def allToOne(dest: Int): Mapping = Mapping(Vector(dest))

  /** All-to-all with results evenly balanced: partition l → fragment l
    * (§5.1: "aggregation results are evenly balanced across all nodes").
    */
  def allToAll(nFragments: Int): Mapping = Mapping(Vector.tabulate(nFragments)(identity))
}
