package repro.refstore

import org.apache.spark.sql.Row

import repro.SparkSpec
import repro.data.{SafetyRating, TweetData}

/** UPSERT/snapshot semantics of the LSM-analog reference store. */
class ReferenceStoreSpec extends SparkSpec {

  private def freshStore(n: Int = 50): ReferenceStore =
    ReferenceStore(spark, "SafetyRatings",
      TweetData.safetyRatings(spark, n), "country_code")

  test("initial snapshot equals the base data") {
    val s = freshStore(40)
    assert(s.snapshot().count() == 40)
    assert(s.version == 0)
    assert(s.deltaSize == 0)
  }

  test("zero-delta snapshot returns the base plan (fast path)") {
    val s = freshStore()
    assert(s.snapshot() eq s.staticSnapshot)
  }

  test("upsert of a new key inserts") {
    val s = freshStore(10)
    s.upsertProducts(Seq(SafetyRating("ZZ", "A")))
    assert(s.snapshot().count() == 11)
    assert(s.version == 1)
  }

  test("upsert of an existing key replaces") {
    val s = freshStore(10)
    val firstKey = s.staticSnapshot.select("country_code").head().getString(0)
    s.upsertProducts(Seq(SafetyRating(firstKey, "ZNEW")))
    val snap = s.snapshot()
    assert(snap.count() == 10)
    val updated = snap.where(s"country_code = '$firstKey'").select("safety_rating").head().getString(0)
    assert(updated == "ZNEW")
  }

  test("last writer wins within the delta") {
    val s = freshStore(5)
    s.upsertProducts(Seq(SafetyRating("QQ", "A")))
    s.upsertProducts(Seq(SafetyRating("QQ", "B")))
    val v = s.snapshot().where("country_code = 'QQ'").select("safety_rating").head().getString(0)
    assert(v == "B")
    assert(s.deltaSize == 1)
  }

  test("version increments per upsert call") {
    val s = freshStore(5)
    s.upsertProducts(Seq(SafetyRating("A1", "A")))
    s.upsertProducts(Seq(SafetyRating("A2", "A"), SafetyRating("A3", "A")))
    assert(s.version == 2)
  }

  test("snapshot is cached per version") {
    val s = freshStore(5)
    s.upsertProducts(Seq(SafetyRating("B1", "A")))
    assert(s.snapshot() eq s.snapshot())
  }

  test("snapshot changes identity after an upsert") {
    val s = freshStore(5)
    val s1 = s.snapshot()
    s.upsertProducts(Seq(SafetyRating("C1", "A")))
    assert(!(s.snapshot() eq s1))
  }

  test("staticSnapshot never sees updates") {
    val s = freshStore(5)
    s.upsertProducts(Seq(SafetyRating("D1", "A")))
    assert(s.staticSnapshot.count() == 5)
    assert(s.snapshot().count() == 6)
  }

  test("an earlier snapshot plan is immune to later upserts") {
    val s = freshStore(5)
    s.upsertProducts(Seq(SafetyRating("E1", "A")))
    val snapAfterFirst = s.snapshot()
    s.upsertProducts(Seq(SafetyRating("E2", "A")))
    assert(snapAfterFirst.count() == 6)
    assert(s.snapshot().count() == 7)
  }

  test("upsert rejects rows of wrong arity") {
    val s = freshStore(5)
    intercept[IllegalArgumentException] { s.upsert(Seq(Row("only-one-field"))) }
  }

  test("bulk upsert of 500 rows merges correctly") {
    val s = freshStore(100)
    val fresh = (0 until 500).map(i => SafetyRating(f"NEW$i%03d", "Z"))
    s.upsertProducts(fresh)
    assert(s.snapshot().count() == 600)
    assert(s.snapshot().where("safety_rating = 'Z'").count() == 500)
  }

  test("concurrent upserts from two threads all land") {
    val s = freshStore(10)
    val t1 = new Thread(() => (0 until 50).foreach(i => s.upsertProducts(Seq(SafetyRating(f"T1$i%03d", "A")))))
    val t2 = new Thread(() => (0 until 50).foreach(i => s.upsertProducts(Seq(SafetyRating(f"T2$i%03d", "B")))))
    t1.start(); t2.start(); t1.join(); t2.join()
    assert(s.snapshot().count() == 110)
    assert(s.version == 100)
  }

  test("snapshot reads are safe while an updater thread runs") {
    val s = freshStore(20)
    @volatile var failure: Option[Throwable] = None
    val updater = new Thread(() =>
      try (0 until 30).foreach { i =>
        s.upsertProducts(Seq(SafetyRating(f"U$i%03d", "A")))
        Thread.sleep(1)
      } catch { case t: Throwable => failure = Some(t) })
    updater.start()
    (0 until 10).foreach { _ =>
      val c = s.snapshot().count()
      assert(c >= 20 && c <= 50)
    }
    updater.join()
    assert(failure.isEmpty)
    assert(s.snapshot().count() == 50)
  }
}
