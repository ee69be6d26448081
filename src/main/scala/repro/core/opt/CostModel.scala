package repro.core.opt

/** Physical join operator choice — the Spark analogue of the paper's
  * hash-vs-nested-loop risk: a broadcast hash join is very cheap when the
  * build side is truly small and disastrous when its cardinality was
  * underestimated (the build side is replicated to every task and may spill).
  */
sealed trait Physical
object Physical {
  case object BroadcastHash extends Physical
  case object ShuffleHash   extends Physical
}

/** The planner's cost model (classic, simplistic — deliberately so).
  *
  * Costs are in abstract "row work units". The planner charges:
  *  - scan: one unit per stored row of the table (no indexes);
  *  - shuffle join: `shuffleFactor` per input row on both sides (exchange),
  *    `buildFactor` per build row, one unit per probe row and output row;
  *  - broadcast join: `bcastCopyFactor` per build row (single copy in the
  *    planner's imagination), one unit per probe and output row.
  *
  * [[repro.core.exec.SimExecutor]] re-prices the *same* plan with true
  * cardinalities and a richer model (replication to all partitions, spill
  * penalties), which is precisely the optimizer-model-vs-runtime divergence
  * the paper's Table II exposes.
  */
final case class CostModel(
    shuffleFactor: Double   = 3.0,
    buildFactor: Double     = 1.5,
    bcastCopyFactor: Double = 2.0,
    bcastRowLimit: Double   = 8000.0,
    partitions: Int         = 8,
    memRows: Double         = 2e6,
    spillFactor: Double     = 4.0,
    writeFactor: Double     = 2.0,
) {

  def scanCost(storedRows: Long): Double = storedRows.toDouble

  /** Pick the physical operator from *estimated* input sizes; the smaller
    * estimated side is the build side.
    */
  def choosePhysical(leftRows: Double, rightRows: Double): (Physical, Boolean) = {
    val buildLeft = leftRows <= rightRows
    val build     = math.min(leftRows, rightRows)
    val phys = if (build <= bcastRowLimit) Physical.BroadcastHash else Physical.ShuffleHash
    (phys, buildLeft)
  }

  /** Planner-side (estimated) cost of one join operator. */
  def joinCost(phys: Physical, buildRows: Double, probeRows: Double, outRows: Double): Double =
    phys match {
      case Physical.BroadcastHash =>
        bcastCopyFactor * buildRows + probeRows + outRows
      case Physical.ShuffleHash =>
        shuffleFactor * (buildRows + probeRows) + buildFactor * buildRows + probeRows + outRows
    }

  /** Runtime-side (true cardinality) work of one join operator: broadcast
    * replicates the build side to every partition; oversized hash tables
    * spill.
    */
  def runtimeJoinWork(phys: Physical, buildRows: Double, probeRows: Double, outRows: Double): Double =
    phys match {
      case Physical.BroadcastHash =>
        val spill = if (buildRows > memRows) spillFactor else 1.0
        partitions * buildRows * spill + probeRows + outRows
      case Physical.ShuffleHash =>
        val spill = if (buildRows > memRows) spillFactor else 1.0
        shuffleFactor * (buildRows + probeRows) + buildFactor * buildRows * spill + probeRows + outRows
    }
}
