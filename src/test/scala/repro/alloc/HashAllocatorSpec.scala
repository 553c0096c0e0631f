package repro.alloc

import repro.SparkSpec

/** Hash-based allocation baseline. */
class HashAllocatorSpec extends SparkSpec {
  import spark.implicits._

  private def accountsDf(n: Int) = (0L until n.toLong).toDF("account")

  test("every account is mapped to a shard in [0, k)") {
    val df = HashAllocator.allocate(accountsDf(1000), 7).collect()
    assert(df.length == 1000)
    df.foreach(r => assert(r.getInt(1) >= 0 && r.getInt(1) < 7))
  }

  test("deterministic across invocations") {
    val a = HashAllocator.allocate(accountsDf(500), 5).sort("account").collect().toSeq
    val b = HashAllocator.allocate(accountsDf(500), 5).sort("account").collect().toSeq
    assert(a == b)
  }

  test("roughly uniform shard sizes") {
    val counts = HashAllocator.allocate(accountsDf(8000), 16)
      .groupBy("shard").count().collect().map(_.getLong(1))
    assert(counts.length == 16)
    val avg = 8000.0 / 16
    counts.foreach(c => assert(c > avg * 0.7 && c < avg * 1.3, s"skewed: ${counts.toSeq}"))
  }

  test("k = 1 maps everything to shard 0") {
    val df = HashAllocator.allocate(accountsDf(100), 1).collect()
    df.foreach(r => assert(r.getInt(1) == 0))
  }

  for (k <- Seq(2, 4, 8, 32)) {
    test(s"all $k shards are used with enough accounts") {
      val used = HashAllocator.allocate(accountsDf(4000), k)
        .select("shard").distinct().collect().map(_.getInt(0)).toSet
      assert(used == (0 until k).toSet)
    }
  }
}
