package repro.spark

import java.nio.file.Files

import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{CodedRow, ERow, OvcInvariants}

/** DataSourceV2 OvcStore: prefix-truncated sorted files whose scan emits the
  * `ovc` column for free (paper §4.10).
  */
class OvcStoreSpec extends SparkSpec {

  private def tmp(): String = {
    val d = Files.createTempDirectory("ovcstore").toFile
    d.deleteOnExit()
    d.getAbsolutePath
  }

  private def readStore(dir: String) =
    spark.read.format(classOf[OvcStoreProvider].getName).option("path", dir).load()

  test("write/read roundtrip preserves rows exactly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 400)
      .selectExpr("k", "cast(v * 100 as long) as v2")
    val dir = tmp()
    val counts = OvcStore.write(df, Seq("k", "v2"), dir)
    assert(counts.sum == 20000)
    val back = readStore(dir)
    assert(back.count() == 20000)
    val got = back.select("k", "v2").collect().map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    val exp = df.collect().map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    assert(got == exp)
  }

  test("scanned ovc column forms a valid chain in every file partition") {
    val df = SynthData.uniformKeys(spark, rows = 15000, nKeys = 300)
      .selectExpr("k", "cast(v * 50 as long) as v2")
    val dir = tmp()
    OvcStore.write(df, Seq("k", "v2"), dir)
    val parts = readStore(dir).rdd.mapPartitions { it =>
      val rows = it.map(r => CodedRow(Array(r.getLong(0), r.getLong(1)), r.getLong(2),
                                      ERow.NoPayload)).toVector
      Iterator.single(rows)
    }.collect()
    assert(parts.map(_.size).sum == 15000)
    parts.foreach(p => OvcInvariants.verifyChain(p, 2))
  }

  test("group count straight off the stored codes matches DuckDB") {
    OvcExpressions.register(spark)
    val df = SynthData.uniformKeys(spark, rows = 25000, nKeys = 600).select("k")
    val dir = tmp()
    OvcStore.write(df, Seq("k"), dir)
    readStore(dir).createOrReplaceTempView("store")
    // §4.4 duplicate removal on the scan output: rows with offset == arity.
    val distinctViaStore = spark.sql("SELECT k FROM store WHERE NOT ovc_is_dup(ovc, 1)")
    Oracle.assertEquivalent(distinctViaStore, "SELECT DISTINCT k FROM t", "t" -> df)
  }

  test("prefix truncation compresses relative to plain storage") {
    val df = SynthData.uniformKeys(spark, rows = 50000, nKeys = 100)
      .selectExpr("k", "k as k2", "k as k3")
    val dir = tmp()
    OvcStore.write(df, Seq("k", "k2", "k3"), dir)
    val bytes = OvcStore.files(dir).map(_.length).sum
    // Plain storage would be 3 longs/row = 1.2 MB; sorted heavy-duplicate
    // data prefix-truncates to far less.
    assert(bytes < 50000L * 3 * 8 / 2, s"store too large: $bytes bytes")
  }

  test("store scan of lineitem keys feeds OVC grouping with oracle-checked results") {
    val li = SynthData.lineitem(spark, sf = 0.01).select("l_orderkey", "l_linenumber")
    val dir = tmp()
    OvcStore.write(li, Seq("l_orderkey", "l_linenumber"), dir)
    OvcExpressions.register(spark)
    readStore(dir).createOrReplaceTempView("li_store")
    val got = spark.sql(
      """SELECT l_orderkey, l_linenumber, count(*) AS cnt
        |FROM li_store GROUP BY l_orderkey, l_linenumber""".stripMargin)
    Oracle.assertEquivalent(
      got,
      "SELECT l_orderkey, l_linenumber, count(*) AS cnt FROM li GROUP BY l_orderkey, l_linenumber",
      "li" -> li)
  }
}
