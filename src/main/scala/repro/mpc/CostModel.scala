package repro.mpc

/** Per-backend cost constants, in seconds per primitive operation.
  *
  * The substrate *executes* every oblivious protocol (so operation counts —
  * and hence asymptotic shape — are real), and converts the executed counts
  * to modeled wall-clock seconds via these constants. The constants are
  * calibrated against the anchor points the paper reports; each anchor is
  * noted below. Absolute times are therefore approximations of the authors'
  * 2018 testbed, but crossovers and slopes follow from real op counts.
  */
final case class CostParams(
    name: String,
    /** Storage/VM-layer cost per shared row touched by an operator.
      * Anchor: Sharemind projection over 3M rows takes >10 min (Fig. 1c)
      * → ~2e-4 s/row.
      */
    rowTouch: Double,
    /** Oblivious 64-bit equality test.
      * Anchor: Sharemind join at 10k x 10k rows (1e8 equality tests) takes
      * "over twenty minutes" (Fig. 5 caption) → ~1.4e-5 s each.
      */
    eq: Double,
    /** Oblivious 64-bit comparison (less-than), incl. its use inside a
      * sorting-network compare-exchange.
      * Anchor: Sharemind aggregation of 30k rows (bitonic sort ≈ 1.8M
      * compare-exchanges) takes ~10 min (Fig. 5 caption) → ~3e-4 s each.
      * Comparisons are far costlier than equality in additive sharing
      * (bit-decomposition vs. masked zero-test), hence the gap.
      */
    cmp: Double,
    /** One Beaver-triple multiplication (also one flag-mux). */
    mul: Double,
    /** One network round-trip between parties. */
    round: Double,
    /** Per-element cost of a resharing-based oblivious shuffle. */
    shuffleEl: Double,
    /** Garbled-circuit backends: seconds per gate. */
    gate: Double,
    /** Garbled-circuit backends: bytes of live wire-label state per record,
      * per unit of op-specific circuit width (see `GcOpWidth`).
      */
    labelBytes: Long,
    /** Simulated memory ceiling in bytes; 0 = unlimited. */
    memCeiling: Long,
    /** Fixed per-MPC-invocation setup cost (circuit generation, handshakes).
      * Dominates SMCQL's per-slice executions (Fig. 7a).
      */
    setup: Double,
)

object CostParams {

  /** Sharemind-like 3-party secret-sharing backend (paper's primary MPC). */
  val Sharemind: CostParams = CostParams(
    name = "sharemind",
    rowTouch = 2.0e-4,
    eq = 1.4e-5,
    cmp = 3.0e-4,
    mul = 2.0e-6,
    round = 1.0e-3,
    shuffleEl = 8.0e-6,
    gate = 0.0, labelBytes = 0L, memCeiling = 0L,
    setup = 2.0,
  )

  /** Obliv-C-like 2-party garbled-circuit backend.
    * Anchors: join OOMs at ~30k input records, projection at ~300k
    * (Fig. 1b/1c); gate rate ~1M gates/s.
    */
  val OblivC: CostParams = CostParams(
    name = "obliv-c",
    rowTouch = 5.0e-5,
    eq = 0.0, cmp = 0.0, mul = 0.0, round = 0.0, shuffleEl = 0.0,
    gate = 1.0e-6,
    labelBytes = 16L,
    memCeiling = 4L * 1024 * 1024 * 1024,
    setup = 1.0,
  )

  /** ObliVM-like garbled-circuit backend used by the SMCQL baseline.
    * The paper notes ObliVM is considerably slower than Sharemind and
    * Obliv-C, "particularly on large data" (§7.4): slower gates and a heavy
    * per-invocation setup that dominates sliced execution.
    */
  val ObliVM: CostParams = CostParams(
    name = "oblivm",
    rowTouch = 1.0e-4,
    eq = 0.0, cmp = 0.0, mul = 0.0, round = 0.0, shuffleEl = 0.0,
    // Anchor: SMCQL comorbidity exceeds an hour at 20k total input rows
    // (~2k rows entering MPC after the aggregation split), §7.4.
    gate = 5.0e-5,
    labelBytes = 24L,
    memCeiling = 24L * 1024 * 1024 * 1024,
    setup = 1.0,
  )
}

/** Simulated out-of-memory in a garbled-circuit backend (Obliv-C genuinely
  * OOMs at ~30k join records on the paper's 4 GB VMs).
  */
final case class MpcOutOfMemory(backend: String, op: String, bytes: Long, ceiling: Long)
    extends RuntimeException(
      s"$backend: simulated OOM in $op: circuit state ${bytes / (1024 * 1024)} MiB " +
        s"exceeds ${ceiling / (1024 * 1024)} MiB")

/** Mutable meter of executed MPC primitives for one query execution.
  *
  * Counters are incremented by the engines/protocols as they actually run;
  * `modeledSeconds` converts them to simulated wall-clock using the
  * backend's `CostParams`.
  */
final class CostMeter(val params: CostParams) {
  var rowsTouched: Long = 0
  var eqs: Long = 0
  var cmps: Long = 0
  var muls: Long = 0
  var rounds: Long = 0
  var shuffledElems: Long = 0
  var gates: Long = 0
  var setups: Long = 0
  /** High-water mark of simulated circuit state (GC backends). */
  var peakMemBytes: Long = 0

  def addRows(n: Long): Unit = rowsTouched += n
  def addEq(n: Long = 1): Unit = eqs += n
  def addCmp(n: Long = 1): Unit = cmps += n
  def addMul(n: Long = 1): Unit = muls += n
  def addRound(n: Long = 1): Unit = rounds += n
  def addShuffle(elems: Long): Unit = shuffledElems += elems
  def addGates(n: Long): Unit = gates += n
  def addSetup(): Unit = setups += 1

  /** Track simulated memory; throws `MpcOutOfMemory` above the ceiling. */
  def checkMem(op: String, bytes: Long): Unit = {
    if (bytes > peakMemBytes) peakMemBytes = bytes
    if (params.memCeiling > 0 && bytes > params.memCeiling)
      throw MpcOutOfMemory(params.name, op, bytes, params.memCeiling)
  }

  def modeledSeconds: Double =
    rowsTouched * params.rowTouch +
      eqs * params.eq +
      cmps * params.cmp +
      muls * params.mul +
      rounds * params.round +
      shuffledElems * params.shuffleEl +
      gates * params.gate +
      setups * params.setup

  def snapshot: CostSnapshot =
    CostSnapshot(rowsTouched, eqs, cmps, muls, rounds, shuffledElems, gates, setups,
      peakMemBytes, modeledSeconds)

  def reset(): Unit = {
    rowsTouched = 0; eqs = 0; cmps = 0; muls = 0; rounds = 0
    shuffledElems = 0; gates = 0; setups = 0; peakMemBytes = 0
  }
}

/** Immutable copy of a meter's counters, for reporting. */
final case class CostSnapshot(
    rowsTouched: Long, eqs: Long, cmps: Long, muls: Long, rounds: Long,
    shuffledElems: Long, gates: Long, setups: Long, peakMemBytes: Long,
    modeledSeconds: Double)
