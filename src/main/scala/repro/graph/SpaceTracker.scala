package repro.graph

import org.apache.spark.sql.DataFrame
import scala.collection.mutable

/** Thrown when an algorithm's live intermediate state exceeds the harness cap
  * — the analogue of the paper's "did not finish with the available
  * resources" entries ("—" in Tables III–V).
  */
final case class BlowUpException(algo: String, liveRows: Long, capRows: Long)
    extends RuntimeException(s"$algo exceeded space cap: $liveRows live rows > cap $capRows")

/** Accounting for the paper's space metrics (Tables IV and V).
  *
  * Every intermediate an algorithm materialises corresponds to a
  * `CREATE TABLE` in the paper's SQL scripts; [[materialize]] plays that role
  * here (localCheckpoint = write the table, count = its row count) and
  * [[drop]] plays `DROP TABLE`. From these events we track:
  *
  *   - maximum live rows at any instant → Table IV "maximum space used";
  *   - total rows ever written          → Table V "total gigabytes written"
  *     (what a transaction would have to retain).
  *
  * All tables in every algorithm here are pairs of int64, so bytes are
  * rows * 16 — compression constants cancel in the input-relative ratios
  * EXPERIMENTS.md compares.
  */
final class SpaceTracker(val bytesPerRow: Long = 16L, val capRows: Long = Long.MaxValue,
                         val algoName: String = "") {
  private val live               = mutable.LinkedHashMap.empty[String, Long]
  private var maxLive            = 0L
  private var written            = 0L
  private val roundRowsBuf       = mutable.ArrayBuffer.empty[Long]

  /** Materialise a DataFrame (truncating lineage) and record its size.
    *
    * `localCheckpoint` alone is not enough: Spark copies the *estimated*
    * statistics of the original plan onto the checkpointed LogicalRDD
    * (`LogicalRDD.rewriteStatsAndConstraints`). Join estimates multiply, so
    * materialising round after round compounds `sizeInBytes` into BigInts
    * whose digit count triples per round — after ~12 rounds the driver spends
    * minutes multiplying million-digit numbers during planning. Re-wrapping
    * the checkpointed RDD in a fresh DataFrame resets the stats to the
    * session default each round, keeping planning O(1) per round.
    */
  def materialize(name: String, df: DataFrame): (DataFrame, Long) = {
    val ck   = df.localCheckpoint(true)
    val out  = df.sparkSession.createDataFrame(ck.rdd, ck.schema)
    val rows = out.count()
    create(name, rows)
    (out, rows)
  }

  /** Record creation of a table of `rows` rows under `name`. */
  def create(name: String, rows: Long): Unit = {
    live(name) = rows
    written += rows
    val total = live.valuesIterator.sum
    if (total > maxLive) maxLive = total
    if (total > capRows) throw BlowUpException(algoName, total, capRows)
  }

  /** Record dropping the table `name` (space is freed). */
  def drop(name: String): Unit = live.remove(name)

  /** Record `ALTER TABLE old RENAME TO new` — no data written or freed. */
  def rename(oldName: String, newName: String): Unit =
    live.remove(oldName).foreach(rows => live(newName) = rows)

  /** Record the edge-table size after a contraction round (shrink telemetry). */
  def recordRound(edgeRows: Long): Unit = roundRowsBuf += edgeRows

  def maxLiveRows: Long        = maxLive
  def totalWrittenRows: Long   = written
  def maxLiveBytes: Long       = maxLive * bytesPerRow
  def totalWrittenBytes: Long  = written * bytesPerRow
  def liveRows: Long           = live.valuesIterator.sum
  def roundEdgeRows: Seq[Long] = roundRowsBuf.toSeq
}
