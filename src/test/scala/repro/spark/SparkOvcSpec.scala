package repro.spark

import org.apache.spark.sql.Row

import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{Ovc, OvcInvariants, OvcStats, CodedRow, ERow}

/** Spark integration: the OVC artificial column, OVC-driven group count and
  * intersect-distinct inside executors, and the Catalyst expressions. All
  * query results are checked against DuckDB via the Oracle.
  */
class SparkOvcSpec extends SparkSpec {

  test("sortedWithOvc yields a valid per-partition code chain") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 500)
      .selectExpr("k", "cast(v * 1000 as long) as v2")
    val coded = OvcSpark.sortedWithOvc(df, Seq("k", "v2"))
    val parts = coded.rdd.mapPartitions { it =>
      val rows = it.map(r => CodedRow(Array(r.getLong(0), r.getLong(1)), r.getLong(2),
                                      ERow.NoPayload)).toVector
      Iterator.single(rows)
    }.collect()
    assert(parts.map(_.size).sum == 20000)
    parts.foreach(p => OvcInvariants.verifyChain(p, 2))
  }

  test("ovc column marks duplicates exactly where keys repeat") {
    val df = SynthData.uniformKeys(spark, rows = 5000, nKeys = 100).select("k")
    val coded = OvcSpark.sortedWithOvc(df, Seq("k"))
    val perPart = coded.rdd.mapPartitions { it =>
      val rows = it.map(r => (r.getLong(0), r.getLong(1))).toVector
      Iterator.single(rows)
    }.collect()
    perPart.foreach { rows =>
      rows.zipWithIndex.foreach { case ((k, code), i) =>
        val isDup = Ovc.isDup(code)
        if (i == 0) assert(!isDup)
        else assert(isDup == (rows(i - 1)._1 == k))
      }
    }
  }

  test("OVC group count on uniform keys matches DuckDB") {
    val df = SynthData.uniformKeys(spark, rows = 30000, nKeys = 700).select("k")
    val got = OvcSpark.groupCount(df, Seq("k"))
    Oracle.assertEquivalent(got, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
  }

  test("OVC group count on zipf-skewed keys matches DuckDB") {
    val df = SynthData.zipfKeys(spark, rows = 30000, nKeys = 300).select("k")
    val got = OvcSpark.groupCount(df, Seq("k"))
    Oracle.assertEquivalent(got, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
  }

  test("OVC group count on two lineitem columns matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.01).select("l_orderkey", "l_linenumber")
    val got = OvcSpark.groupCount(li, Seq("l_orderkey", "l_linenumber"))
    Oracle.assertEquivalent(
      got,
      "SELECT l_orderkey, l_linenumber, count(*) AS cnt FROM li GROUP BY l_orderkey, l_linenumber",
      "li" -> li)
  }

  test("OVC group count equals Spark's own groupBy at SF=0.01") {
    val li = SynthData.lineitem(spark, sf = 0.01).select("l_orderkey")
    val got = OvcSpark.groupCount(li, Seq("l_orderkey")).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toMap
    val exp = li.groupBy("l_orderkey").count().collect()
      .map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(got == exp)
  }

  test("OVC intersect-distinct matches DuckDB INTERSECT") {
    val t1 = SynthData.uniformKeys(spark, rows = 20000, nKeys = 3000, seed = 1).select("k")
    val t2 = SynthData.uniformKeys(spark, rows = 20000, nKeys = 4000, seed = 2).select("k")
    val got = OvcSpark.intersectDistinct(t1, t2, Seq("k"))
    Oracle.assertEquivalent(got, "SELECT k FROM t1 INTERSECT SELECT k FROM t2",
                            "t1" -> t1, "t2" -> t2)
  }

  test("OVC intersect-distinct on a composite lineitem key matches DuckDB") {
    val t1 = SynthData.lineitem(spark, sf = 0.01, seed = 0).select("l_orderkey", "l_partkey")
    val t2 = SynthData.lineitem(spark, sf = 0.01, seed = 99).select("l_orderkey", "l_partkey")
    val got = OvcSpark.intersectDistinct(t1, t2, Seq("l_orderkey", "l_partkey"))
    Oracle.assertEquivalent(
      got,
      "SELECT l_orderkey, l_partkey FROM t1 INTERSECT SELECT l_orderkey, l_partkey FROM t2",
      "t1" -> t1, "t2" -> t2)
  }

  test("OVC intersect-distinct equals Spark's intersect at SF=0.01") {
    val u1 = SynthData.lineitem(spark, sf = 0.01, seed = 3).select("l_orderkey", "l_partkey")
    val u2 = SynthData.lineitem(spark, sf = 0.01, seed = 4).select("l_orderkey", "l_partkey")
    val got = OvcSpark.intersectDistinct(u1, u2, Seq("l_orderkey", "l_partkey"))
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val exp = u1.intersect(u2).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == exp)
  }

  test("ovc_offset and ovc_is_dup expressions decode the artificial column in SQL") {
    OvcExpressions.register(spark)
    val df = SynthData.uniformKeys(spark, rows = 2000, nKeys = 50).select("k")
    OvcSpark.sortedWithOvc(df, Seq("k")).createOrReplaceTempView("coded")
    val rows = spark.sql(
      "SELECT k, ovc, ovc_offset(ovc, 1) AS off, ovc_is_dup(ovc, 1) AS dup FROM coded").collect()
    rows.foreach { r =>
      val code = r.getLong(1)
      assert(r.getInt(2) == Ovc.offsetOf(code, 1))
      assert(r.getBoolean(3) == Ovc.isDup(code))
    }
    val dupsViaSql = spark.sql("SELECT count(*) FROM coded WHERE ovc_is_dup(ovc, 1)").collect()(0).getLong(0)
    val distinct = df.distinct().count()
    assert(dupsViaSql == 2000 - distinct)
  }

  test("expressions work under codegen in a filter pipeline") {
    OvcExpressions.register(spark)
    val df = SynthData.uniformKeys(spark, rows = 5000, nKeys = 200).select("k")
    val coded = OvcSpark.sortedWithOvc(df, Seq("k"))
    coded.createOrReplaceTempView("coded2")
    // Filtering out duplicates via the expression is duplicate removal (§4.4).
    val n = spark.sql("SELECT k FROM coded2 WHERE NOT ovc_is_dup(ovc, 1)").count()
    assert(n == df.distinct().count())
  }
}
