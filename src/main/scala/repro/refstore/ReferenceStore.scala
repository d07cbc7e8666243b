package repro.refstore

import scala.collection.mutable
import scala.jdk.CollectionConverters._

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions.col

/** A versioned, upsertable reference dataset — the analog of an AsterixDB
  * dataset backed by an LSM tree.
  *
  * The immutable `base` DataFrame plays the role of the on-disk LSM
  * components; the in-memory delta map plays the role of the LSM memory
  * component that an `UPSERT` activates. `snapshot()` merges the two with
  * last-writer-wins semantics on the primary key. When no update has ever
  * arrived, `snapshot()` returns the base directly (the paper's observation
  * that the *first* update changes the access path — and measurably slows
  * readers — is mirrored by this fast path disappearing).
  *
  * Thread-safe: the ingestion pipeline reads snapshots while an updater
  * thread upserts (paper §7.3). Each snapshot is an immutable plan over a
  * frozen copy of the delta, so a computing job sees exactly the updates
  * applied before it started — the record-level consistency model the paper
  * assumes.
  */
final class ReferenceStore(
    val name: String,
    spark: SparkSession,
    base: DataFrame,
    val primaryKey: String) {

  private val pkIdx = base.schema.fieldIndex(primaryKey)
  private val delta = mutable.LinkedHashMap.empty[String, Row]
  private var ver: Long = 0L
  private var cachedVer: Long = -1L
  private var cachedSnap: DataFrame = base

  /** Number of upsert calls applied so far (monotonic). */
  def version: Long = synchronized(ver)

  /** Number of distinct keys currently in the in-memory delta component. */
  def deltaSize: Int = synchronized(delta.size)

  /** UPSERT: insert rows, replacing any existing row with the same key
    * (paper footnote 1). Rows must match the base schema.
    */
  def upsert(rows: Seq[Row]): Unit = synchronized {
    rows.foreach { r =>
      require(r.size == base.schema.size,
        s"$name: upsert row arity ${r.size} != schema arity ${base.schema.size}")
      delta(String.valueOf(r.get(pkIdx))) = r
    }
    ver += 1
  }

  /** UPSERT of case-class instances whose field order matches the schema. */
  def upsertProducts(ps: Seq[Product]): Unit =
    upsert(ps.map(p => Row.fromSeq(p.productIterator.toSeq)))

  /** Current merged view. Cached per version so repeated reads between
    * updates (e.g. several UDFs sharing one store) build the plan once.
    */
  def snapshot(): DataFrame = synchronized {
    if (ver == cachedVer) return cachedSnap
    val snap =
      if (delta.isEmpty) base
      else {
        val deltaDf = spark.createDataFrame(delta.values.toList.asJava, base.schema)
        val keys = delta.keys.toSeq
        base
          .where(!col(primaryKey).cast("string").isin(keys: _*))
          .unionByName(deltaDf)
      }
    cachedVer = ver
    cachedSnap = snap
    snap
  }

  /** A snapshot frozen at construction time — what a static (Model 3)
    * pipeline holds on to for its whole lifetime.
    */
  val staticSnapshot: DataFrame = base
}

object ReferenceStore {
  def apply(spark: SparkSession, name: String, base: DataFrame, pk: String): ReferenceStore =
    new ReferenceStore(name, spark, base, pk)
}
