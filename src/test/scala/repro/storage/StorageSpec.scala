package repro.storage

import org.apache.spark.sql.functions._

import repro.SparkSpec

class StorageSpec extends SparkSpec {

  private def df(n: Int, seed: Long = 0) =
    spark.range(n).select(col("id"), rand(seed).as("v"))

  test("put records exact row count and width-based bytes") {
    val s = new StorageService(spark, 1L << 30)
    val meta = s.put("a", df(100), band = 0)
    assert(meta.rows == 100)
    assert(meta.bytes == 100 * 16) // id long + v double
    s.reset()
  }

  test("get returns the stored rows") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(50), 0)
    assert(s.get("a", 0).count() == 50)
    s.reset()
  }

  test("get of a missing key fails") {
    val s = new StorageService(spark, 1L << 30)
    assertThrows[NoSuchElementException](s.get("nope", 0))
    s.reset()
  }

  test("duplicate put rejected") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(10), 0)
    assertThrows[IllegalArgumentException](s.put("a", df(10), 0))
    s.reset()
  }

  test("local vs remote gets tracked by band") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(10), band = 2)
    s.get("a", 2); s.get("a", 3)
    val st = s.stats
    assert(st.localGets == 1 && st.remoteGets == 1)
    s.reset()
  }

  test("over-budget puts spill LRU chunks to the disk tier") {
    val s = new StorageService(spark, memoryBudget = 40 * 16) // room for ~40 rows
    s.put("a", df(30, 1), 0) // 480 B
    s.put("b", df(30, 2), 0) // now 960 B > 640 → "a" spills
    assert(s.tierOf("a").contains(Tier.Disk))
    assert(s.tierOf("b").contains(Tier.Memory))
    assert(s.stats.spills == 1)
    s.reset()
  }

  test("spilled chunks read back identically from parquet") {
    val s = new StorageService(spark, memoryBudget = 40 * 16)
    val a = df(30, 7)
    val expect = a.collect().map(_.toSeq.toString).sorted
    s.put("a", a, 0)
    s.put("b", df(30, 8), 0)
    assert(s.tierOf("a").contains(Tier.Disk))
    val got = s.get("a", 0).collect().map(_.toSeq.toString).sorted
    assert(got.sameElements(expect))
    s.reset()
  }

  test("LRU eviction spills the least recently used chunk") {
    val s = new StorageService(spark, memoryBudget = 70 * 16)
    s.put("a", df(30, 1), 0)
    s.put("b", df(30, 2), 0)
    s.get("a", 0) // touch a → b becomes LRU
    s.put("c", df(30, 3), 0)
    assert(s.tierOf("b").contains(Tier.Disk))
    assert(s.tierOf("a").contains(Tier.Memory))
    s.reset()
  }

  test("free removes a chunk and releases memory accounting") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(100), 0)
    val before = s.stats.memBytes
    s.free("a")
    assert(s.stats.memBytes == before - 100 * 16)
    assert(!s.contains("a"))
    s.reset()
  }

  test("peak memory tracks the high-water mark") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(100), 0)
    s.free("a")
    s.put("b", df(10), 0)
    assert(s.stats.peakMemBytes == 100 * 16)
    s.reset()
  }

  test("meta and bandOf are queryable after put") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(5), band = 3)
    assert(s.meta("a").exists(_.rows == 5))
    assert(s.bandOf("a").contains(3))
    assert(s.meta("zz").isEmpty)
    s.reset()
  }

  test("reset clears everything") {
    val s = new StorageService(spark, 1L << 30)
    s.put("a", df(5), 0); s.put("b", df(5), 0)
    s.reset()
    assert(!s.contains("a") && !s.contains("b"))
    assert(s.stats.memBytes == 0)
  }
}
