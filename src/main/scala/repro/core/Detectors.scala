package repro.core

/** Factory for the four duplicate-detection approaches compared in Sec. 7.3
  * (Tables 9/10). All share the [[DedupIndex]] engine; they differ only in
  * examination order, matching strategy, and accuracy gating — exactly the
  * axes the paper varies.
  */
object Detectors {

  /** Default gate: validate every 5 blocks, stop at 3.5 % drop (Sec. 7.3). */
  val DefaultGate: Gate = Gate(checkEvery = 5, maxDrop = 0.035)

  /** The paper's approach: L2 LSH + magnitude-ascending order + gate.
    * The signature is banded (4 bands of 3 hashes, OR semantics — the
    * multi-hash-table construction of [32]) so near-duplicates whose dot
    * products straddle one bucket boundary still collide, while 3-hash
    * bands keep the false-collision rate between genuinely distinct
    * low-magnitude blocks at a few percent.
    */
  def proposed(dim: Int, k: Int = 12, w: Double = 0.25, bands: Int = 4, seed: Long = 17L,
               gate: Gate = DefaultGate): DedupIndex =
    new DedupIndex(DedupConfig(ExamOrder.MagnitudeAscending,
      SignatureMatcher(new L2Lsh(dim, k, w, seed), bands = bands), Some(gate)))

  /** Mistique exact dedup: content-hash match, no ordering, no gate
    * (bit-exact replacement cannot change accuracy).
    */
  def mistiqueExact(): DedupIndex =
    new DedupIndex(DedupConfig(ExamOrder.Natural,
      SignatureMatcher(new ExactHasher, verifyContent = true), None))

  /** Mistique approximate dedup: MinHash over discretized values with
    * banding — aggressive, and expensive per probe (the many-permutation
    * signature the paper times in Table 9). Gated, but examined in natural
    * order, so accuracy-critical blocks are reached early.
    */
  def mistiqueApprox(dim: Int, perms: Int = 64, bands: Int = 16,
                     binWidth: Double = 0.2, seed: Long = 23L,
                     gate: Gate = DefaultGate): DedupIndex =
    new DedupIndex(DedupConfig(ExamOrder.Natural,
      SignatureMatcher(new MinHashHasher(dim, perms, binWidth, seed), bands = bands),
      Some(gate)))

  /** Pairwise L2 comparison enhanced with magnitude ordering and the gate —
    * the "Enhanced Pairwise" baseline. O(|L|) scan per probe.
    */
  def enhancedPairwise(threshold: Double = 0.3, gate: Gate = DefaultGate): DedupIndex =
    new DedupIndex(DedupConfig(ExamOrder.MagnitudeAscending,
      PairwiseMatcher(threshold), Some(gate)))

  /** Naive pairwise: similarity only, no magnitude ordering (Fig. 6's naive
    * baseline); kept gated so it terminates comparably.
    */
  def naivePairwise(threshold: Double = 0.3, gate: Gate = DefaultGate): DedupIndex =
    new DedupIndex(DedupConfig(ExamOrder.Natural, PairwiseMatcher(threshold), Some(gate)))
}
