package repro.opt

/** Cloud cost/latency constants (§5.1, §6.7).
  *
  * All rates are per byte so they compose directly with dataset sizes:
  *  - `storagePerByteMonth` — C_s, storage cost per byte per billing month
  *  - `readPerByte` / `writePerByte` — r / w; the paper notes hot-tier write
  *    costs are an order of magnitude above read costs, so the edge
  *    reconstruction cost C_e = r·s_p + w·s_q is dominated by the write term
  *  - `maintPerByte` — C_m, expected compute cost of one maintenance
  *    operation (GDPR scan etc.) per byte
  *  - `readLatencyPerByte` / `writeLatencyPerByte` — r_ℓ / w_ℓ, seconds per
  *    byte, for the §5.1 QoS latency estimate L_e = r_ℓ·s_p + w_ℓ·s_q
  */
final case class CostModel(
    storagePerByteMonth: Double,
    readPerByte: Double,
    writePerByte: Double,
    maintPerByte: Double,
    readLatencyPerByte: Double,
    writeLatencyPerByte: Double,
) {
  def reconstructionCost(parentBytes: Double, childBytes: Double): Double =
    readPerByte * parentBytes + writePerByte * childBytes

  def reconstructionLatency(parentBytes: Double, childBytes: Double): Double =
    readLatencyPerByte * parentBytes + writeLatencyPerByte * childBytes
}

object CostModel {
  private val GB = 1024.0 * 1024.0 * 1024.0

  /** Azure ADLS Gen2 hot-tier-like public prices (USD): ~$0.018/GB-month
    * storage; reads ~$0.06/GB-equivalent of transactions; writes ~10× reads;
    * maintenance ≈ one read scan. Latency ≈ 200 MB/s effective throughput.
    */
  val azureHotLike: CostModel = CostModel(
    storagePerByteMonth = 0.018 / GB,
    readPerByte = 0.06 / GB,
    writePerByte = 0.60 / GB,
    maintPerByte = 0.06 / GB,
    readLatencyPerByte = 1.0 / (200.0 * 1024 * 1024),
    writeLatencyPerByte = 1.0 / (100.0 * 1024 * 1024),
  )
}
