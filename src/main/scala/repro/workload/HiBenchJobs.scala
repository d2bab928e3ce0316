package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.SynthData

/** Real DataFrame implementations of the HiBench-lite workloads (§6.1).
  *
  * These run genuinely on Spark (shuffles, joins, iterations) over
  * [[repro.SynthData]] inputs at SF=0.01 (tests) / SF=0.1 (benches); they
  * ground the meta-feature pipeline with real stage/task metrics and are
  * oracle-checked against DuckDB where SQL-expressible. The end-to-end
  * tuning benches use the calibrated simulator specs of
  * [[repro.env.Workloads]] (DESIGN.md §2).
  */
object HiBenchJobs {

  /** Synthetic "documents": one row per line, an array of zipf-drawn words. */
  def documents(spark: SparkSession, sf: Double, seed: Long = 11L): DataFrame = {
    val lines = math.max(100L, (200000 * sf).toLong)
    SynthData.zipfKeys(spark, lines * 8, 5000, alpha = 1.05, seed = seed)
      .select(concat(lit("w"), col("k")) as "word",
              (monotonically_increasing_id() % lines) as "line")
  }

  /** WordCount: word → occurrence count. */
  def wordCount(spark: SparkSession, sf: Double): DataFrame =
    documents(spark, sf).groupBy("word").agg(count(lit(1)) as "cnt")

  /** Sort: total sort of (k, v) pairs; returns the sorted frame. */
  def sortJob(spark: SparkSession, sf: Double): DataFrame = {
    val rows = math.max(1000L, (1000000 * sf).toLong)
    SynthData.uniformKeys(spark, rows, rows * 2, seed = 21).orderBy("k", "v")
  }

  /** TeraSort: range-partitioned sort over skewed string keys. */
  def teraSort(spark: SparkSession, sf: Double): DataFrame = {
    val rows = math.max(1000L, (1000000 * sf).toLong)
    SynthData.zipfKeys(spark, rows, 100000, alpha = 1.1, seed = 22)
      .select(format_string("%012d", col("k")) as "key", col("v") as "payload")
      .repartitionByRange(8, col("key"))
      .sortWithinPartitions("key", "payload")
  }

  /** Naive Bayes training: per-(label, word) counts + per-label priors. */
  def bayes(spark: SparkSession, sf: Double): DataFrame = {
    val docs = documents(spark, sf, seed = 31)
      .withColumn("label", pmod(col("line"), lit(5)))
    docs.groupBy("label", "word").agg(count(lit(1)) as "cnt")
  }

  /** KMeans (Lloyd's): `iters` iterations over `k` centers in 3-d. Returns
    * final centers. Iterative: re-aggregates the cached points each round. */
  def kMeans(spark: SparkSession, sf: Double, k: Int = 5, iters: Int = 4): DataFrame = {
    val rows = math.max(1000L, (500000 * sf).toLong)
    val pts = SynthData.uniformKeys(spark, rows, 1000, seed = 41)
      .select(rand(42) as "x", rand(43) as "y", rand(44) as "z").cache()
    var centers: Array[(Double, Double, Double)] =
      pts.limit(k).collect().map(r => (r.getDouble(0), r.getDouble(1), r.getDouble(2)))
    var it = 0
    while (it < iters) {
      val assignExpr = {
        val dists = centers.zipWithIndex.map { case ((cx, cy, cz), i) =>
          struct(
            (pow(col("x") - cx, 2) + pow(col("y") - cy, 2) + pow(col("z") - cz, 2)) as "d",
            lit(i) as "c")
        }
        array_min(array(dists: _*)).getField("c")
      }
      val agg = pts.withColumn("cluster", assignExpr)
        .groupBy("cluster")
        .agg(avg("x") as "x", avg("y") as "y", avg("z") as "z")
        .collect()
      val next = centers.clone()
      agg.foreach(r => next(r.getInt(0)) = (r.getDouble(1), r.getDouble(2), r.getDouble(3)))
      centers = next
      it += 1
    }
    pts.unpersist()
    val rows2 = centers.zipWithIndex.map { case ((x, y, z), i) => (i, x, y, z) }
    spark.createDataFrame(rows2.toIndexedSeq).toDF("cluster", "x", "y", "z")
  }

  /** Synthetic edge list for the graph workloads. */
  def edges(spark: SparkSession, sf: Double, seed: Long = 51L): DataFrame = {
    val n = math.max(1000L, (800000 * sf).toLong)
    val verts = math.max(100L, (20000 * sf).toLong)
    SynthData.zipfKeys(spark, n, verts, alpha = 1.15, seed = seed)
      .select(col("k") as "src",
              (col("v") * verts + 1).cast("long") as "dst")
      .where(col("src") =!= col("dst"))
      .distinct()
  }

  /** PageRank: `iters` power iterations with damping 0.85. */
  def pageRank(spark: SparkSession, sf: Double, iters: Int = 3): DataFrame = {
    val e = edges(spark, sf).cache()
    val outDeg = e.groupBy("src").agg(count(lit(1)) as "deg")
    val withDeg = e.join(outDeg, "src").cache()
    var ranks = e.select(col("src") as "v").union(e.select(col("dst") as "v"))
      .distinct().withColumn("rank", lit(1.0))
    var it = 0
    while (it < iters) {
      val contribs = withDeg.join(ranks, withDeg("src") === ranks("v"))
        .select(col("dst") as "v", (col("rank") / col("deg")) as "contrib")
      ranks = contribs.groupBy("v").agg((lit(0.15) + lit(0.85) * sum("contrib")) as "rank")
      it += 1
    }
    val out = ranks.select(col("v"), round(col("rank"), 6) as "rank")
    e.unpersist(); withDeg.unpersist()
    out
  }

  /** NWeight: 2-hop neighbourhood weights — for each (src, hop2-dst), the
    * summed product of edge weights along the paths. */
  def nWeight(spark: SparkSession, sf: Double): DataFrame = {
    val e = edges(spark, sf, seed = 61)
      .withColumn("w", rand(62))
    val a = e.select(col("src") as "a_src", col("dst") as "a_dst", col("w") as "a_w")
    val b = e.select(col("src") as "b_src", col("dst") as "b_dst", col("w") as "b_w")
    a.join(b, a("a_dst") === b("b_src"))
      .where(col("a_src") =!= col("b_dst"))
      .groupBy(col("a_src") as "src", col("b_dst") as "dst")
      .agg(round(sum(col("a_w") * col("b_w")), 6) as "weight")
  }

  /** Logistic regression: batch gradient descent via DataFrame aggregates;
    * returns the learned 3-d weight vector (+bias). */
  def logisticRegression(spark: SparkSession, sf: Double, iters: Int = 5,
                         lr: Double = 0.5): DataFrame = {
    val rows = math.max(1000L, (500000 * sf).toLong)
    val data = SynthData.uniformKeys(spark, rows, 100, seed = 71)
      .select(rand(72) as "x1", rand(73) as "x2", rand(74) as "x3")
      .withColumn("label", when(col("x1") + col("x2") * 2 - col("x3") > lit(1.0), 1.0).otherwise(0.0))
      .cache()
    var w = Array(0.0, 0.0, 0.0, 0.0) // w1..w3, bias
    var it = 0
    while (it < iters) {
      val z = col("x1") * w(0) + col("x2") * w(1) + col("x3") * w(2) + lit(w(3))
      val p = lit(1.0) / (lit(1.0) + exp(-z))
      val err = p - col("label")
      val g = data.agg(
        avg(err * col("x1")) as "g1", avg(err * col("x2")) as "g2",
        avg(err * col("x3")) as "g3", avg(err) as "g0").collect()(0)
      w = Array(w(0) - lr * g.getDouble(0), w(1) - lr * g.getDouble(1),
                w(2) - lr * g.getDouble(2), w(3) - lr * g.getDouble(3))
      it += 1
    }
    data.unpersist()
    spark.createDataFrame(Seq((w(0), w(1), w(2), w(3)))).toDF("w1", "w2", "w3", "bias")
  }

  /** SVD substrate: the 3×3 Gram matrix Xᵀ·X of the feature frame, computed
    * distributed; singular values follow locally from it. */
  def gramMatrix(spark: SparkSession, sf: Double): DataFrame = {
    val rows = math.max(1000L, (500000 * sf).toLong)
    val data = SynthData.uniformKeys(spark, rows, 100, seed = 81)
      .select(rand(82) as "x1", rand(83) as "x2", rand(84) as "x3")
    data.agg(
      round(sum(col("x1") * col("x1")), 4) as "g11",
      round(sum(col("x1") * col("x2")), 4) as "g12",
      round(sum(col("x1") * col("x3")), 4) as "g13",
      round(sum(col("x2") * col("x2")), 4) as "g22",
      round(sum(col("x2") * col("x3")), 4) as "g23",
      round(sum(col("x3") * col("x3")), 4) as "g33")
  }

  /** All workloads by name, for the meta-feature extraction tests. */
  def byName(name: String, spark: SparkSession, sf: Double): DataFrame = name match {
    case "wordcount" => wordCount(spark, sf)
    case "sort"      => sortJob(spark, sf)
    case "terasort"  => teraSort(spark, sf)
    case "bayes"     => bayes(spark, sf)
    case "kmeans"    => kMeans(spark, sf)
    case "pagerank"  => pageRank(spark, sf)
    case "nweight"   => nWeight(spark, sf)
    case "lr"        => logisticRegression(spark, sf)
    case "svd"       => gramMatrix(spark, sf)
    case other       => throw new NoSuchElementException(s"unknown job: $other")
  }

  val names: Vector[String] = Vector("wordcount", "sort", "terasort", "bayes",
    "kmeans", "pagerank", "nweight", "lr", "svd")
}
