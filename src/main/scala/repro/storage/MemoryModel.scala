package repro.storage

/** The paper's empirical memory-usage estimation model (§8.1).
  *
  * mem_total = Σ_tables n_replica · [ Σ_indexes n_pk·(|pk|+156)
  *                                    + n_index·n_row·C
  *                                    + K·n_row·|row| ]
  *
  * C = 70 for "latest"/"absorlat" tables, 74 for "absolute"/"absandlat";
  * K ∈ [1, n_index] is the number of full data copies kept.
  */
object MemoryModel {

  sealed trait TableKind { def C: Int }
  case object Latest    extends TableKind { val C = 70 }
  case object Absorlat  extends TableKind { val C = 70 }
  case object Absolute  extends TableKind { val C = 74 }
  case object Absandlat extends TableKind { val C = 74 }

  /** Per-unique-primary-key index overhead beyond the key bytes themselves
    * (skiplist tower, key-node header, time-list head — the paper's 156).
    */
  val PerKeyOverhead = 156

  final case class IndexSpec(nUniqueKeys: Long, avgKeyLen: Int)

  final case class TableSpec(
      kind: TableKind,
      nRows: Long,
      avgRowLen: Int,
      indexes: Seq[IndexSpec],
      nReplica: Int = 1,
      dataCopies: Int = 1) {
    require(dataCopies >= 1 && dataCopies <= math.max(1, indexes.size),
      "K must lie in [1, n_index]")
  }

  /** Estimated bytes for one table (all replicas). */
  def tableBytes(t: TableSpec): Long = {
    val idxKeys  = t.indexes.map(ix => ix.nUniqueKeys * (ix.avgKeyLen + PerKeyOverhead)).sum
    val idxNodes = t.indexes.size.toLong * t.nRows * t.kind.C
    val rows     = t.dataCopies.toLong * t.nRows * t.avgRowLen
    t.nReplica * (idxKeys + idxNodes + rows)
  }

  /** Estimated bytes for a deployment of tables. */
  def totalBytes(tables: Seq[TableSpec]): Long = tables.map(tableBytes).sum
}

/** Runtime memory isolation + alerting (§8.2): a byte-accounted gate in
  * front of a store. Writes above `maxBytes` fail (reads keep working);
  * crossing `alertFraction` fires the alert callback once per excursion.
  */
final class MemoryGuard(maxBytes: Long, alertFraction: Double = 0.8,
                        onAlert: Long => Unit = _ => ()) {
  private val used = new java.util.concurrent.atomic.AtomicLong(0)
  @volatile private var alerted = false

  final class WriteRejectedException(msg: String) extends RuntimeException(msg)

  def usedBytes: Long = used.get()

  /** Account `bytes` for a write; throws WriteRejectedException above the
    * limit without changing the accounted usage.
    */
  def tryWrite(bytes: Long): Unit = {
    val after = used.addAndGet(bytes)
    if (after > maxBytes) {
      used.addAndGet(-bytes)
      throw new WriteRejectedException(
        s"write of $bytes bytes rejected: $after > max $maxBytes (reads remain available)")
    }
    if (!alerted && after > (maxBytes * alertFraction).toLong) {
      alerted = true
      onAlert(after)
    }
  }

  /** Release bytes (eviction / delete); re-arms the alert below threshold. */
  def release(bytes: Long): Unit = {
    val after = used.addAndGet(-bytes)
    if (after <= (maxBytes * alertFraction).toLong) alerted = false
  }
}
