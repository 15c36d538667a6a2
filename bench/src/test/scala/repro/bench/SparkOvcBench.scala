package repro.bench

import repro.{SparkSpec, SynthData}
import repro.spark.OvcSpark

/** Spark-level analogue of the paper's experiments at SF≈0.1 inside local
  * executors: the OVC artificial column drives in-stream aggregation and
  * sort-based intersect-distinct; Spark's native hash-based plans are the
  * baseline.
  *
  * Measurement: the two plans are timed in alternation (5 pairs after a
  * warm-up pair) and medians reported, since whole-plan timings under a
  * shared local[*] SparkSession are noisy. The assertions check correctness
  * (identical results) only; EXPERIMENTS.md discusses the timing spread.
  */
class SparkOvcBench extends SparkSpec {

  /** Median of `reps` alternating (a, b) timings; returns (aMs, bMs, aResult). */
  private def alternate(reps: Int)(a: => Long)(b: => Long): (Double, Double, Long) = {
    a; b // warm-up pair
    val ta = new Array[Double](reps)
    val tb = new Array[Double](reps)
    var ra = 0L
    var i = 0
    while (i < reps) {
      val t0 = System.nanoTime(); ra = a; ta(i) = (System.nanoTime() - t0) / 1e6
      val t1 = System.nanoTime(); val rb = b; tb(i) = (System.nanoTime() - t1) / 1e6
      require(ra == rb, s"plans disagree: $ra vs $rb")
      i += 1
    }
    java.util.Arrays.sort(ta); java.util.Arrays.sort(tb)
    (ta(reps / 2), tb(reps / 2), ra)
  }

  test("Spark: OVC group count vs native hash aggregation at SF=0.1") {
    val li = SynthData.lineitem(spark, sf = 0.1).select("l_orderkey").cache()
    li.count() // materialize (the paper pre-warms its inputs)
    val (ovcMs, hashMs, n) = alternate(5) {
      OvcSpark.groupCount(li, Seq("l_orderkey")).count()
    } {
      li.groupBy("l_orderkey").count().count()
    }
    println()
    println(f"Spark group-count SF=0.1 (600k rows): ovc=$ovcMs%.0fms native-hash=$hashMs%.0fms groups=$n%d")
    println()
    li.unpersist()
  }

  test("Spark: OVC intersect-distinct vs native intersect at SF=0.1") {
    val t1 = SynthData.lineitem(spark, sf = 0.1, seed = 3).select("l_orderkey", "l_partkey").cache()
    val t2 = SynthData.lineitem(spark, sf = 0.1, seed = 4).select("l_orderkey", "l_partkey").cache()
    t1.count(); t2.count()
    val (ovcMs, nativeMs, n) = alternate(5) {
      OvcSpark.intersectDistinct(t1, t2, Seq("l_orderkey", "l_partkey")).count()
    } {
      t1.intersect(t2).count()
    }
    println()
    println(f"Spark intersect-distinct SF=0.1: ovc-sort=$ovcMs%.0fms native-hash=$nativeMs%.0fms rows=$n%d")
    println()
    t1.unpersist(); t2.unpersist()
  }
}
