package repro.apps

/** Linear cost model translating the engine's exact per-superstep counters
  * into modeled elapsed time (DESIGN.md §5).
  *
  * Calibrated against the paper's cluster (Table 3: 24-core nodes,
  * InfiniBand EDR): ~20 ns per scanned edge on the critical-path machine,
  * ~1 ns per communicated byte (≈1 GB/s effective per machine after
  * software overheads), 5 ms barrier per superstep. Only `ET` uses this
  * model — `COM` and `WB` are counted, not modeled.
  */
final case class CostModel(
    secondsPerEdge: Double = 20e-9,
    secondsPerByte: Double = 1e-9,
    secondsPerSuperstep: Double = 5e-3) {

  def superstepSeconds(maxLocalWork: Long, bytes: Long): Double =
    maxLocalWork * secondsPerEdge + bytes * secondsPerByte + secondsPerSuperstep
}

object CostModel {
  /** Bytes per gather/scatter record: 8-byte vertex id + 8-byte value. */
  val RecordBytes = 16L
  val default: CostModel = CostModel()
}
