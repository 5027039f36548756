package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, LongType}
import org.apache.spark.storage.StorageLevel
import repro.graphlet.Graphlet
import repro.treelet.{ColoredTreelet, TreeletEnum}
import scala.util.Random

/** Distributed sampling phase: a batch of S samples advances together
  * through the multi-stage draw of §2.2 as DataFrame jobs.
  *
  * Per batch:
  *  1. roots are drawn on the driver with the alias method over the exact
  *     per-vertex totals (the paper builds the same O(n) alias table);
  *  2. each sample picks its colored k-treelet ∝ c(T_C, v) via a weighted
  *     reservoir: key = −ln(U)/weight, take min_by per sample (an
  *     exponential race is exactly a weighted pick);
  *  3. ≤ k−1 rounds of expansion: each pending (sample, branch, v, T_C)
  *     explodes its color splits, joins the edge list (u ~ v) and the count
  *     tables at both sub-levels, and min_by-picks (split, u) with
  *     probability ∝ c(T'_{C'}, v)·c(T''_{C''}, u);
  *  4. the k resulting vertices (slotted by color) join the undirected edge
  *     pairs to materialize the induced adjacency mask, which a UDF
  *     canonicalizes into the graphlet code.
  *
  * Restricting step 1–2 to one free treelet shape implements the
  * sample(T) primitive of AGS (§4).
  */
final class DistSampler(spark: SparkSession,
                        build: BuildUp.Result,
                        edges: DataFrame,
                        edgePairs: DataFrame,
                        seed: Long = 12345L) extends ShapeSampling {

  val k: Int = build.k
  private val rnd = new Random(seed ^ 0x5DEECE66DL)
  private var batchNo = 0

  private val freeShapeUdf = udf((tc: Long) => TreeletEnum.freeShape(ColoredTreelet.shape(tc)))
  private val sizeUdf = udf((tc: Long) => ColoredTreelet.size(tc))
  private val splitsUdf = udf((tc: Long) =>
    ColoredTreelet.colorSplits(tc).map { case (a, b) => (a, b) })
  private val colorUdf = udf((tc: Long) =>
    Integer.numberOfTrailingZeros(ColoredTreelet.colorMask(tc)))
  private val canonUdf = udf((mask: Long, kk: Int) => Graphlet.canonicalOfCode(mask, kk))

  /** Level-k table with the free shape attached, persisted (reused every batch). */
  private val levelK: DataFrame = build.level(k)
    .withColumn("fs", freeShapeUdf(col("tc")))
    .persist(StorageLevel.MEMORY_AND_DISK)

  /** All inner levels 1..k−1 stacked with a size column, for uniform
    * (h, v, tc) lookups during expansion.
    */
  private val inner: DataFrame = (1 until k)
    .map(h => build.level(h).withColumn("h", lit(h)))
    .reduce(_ unionAll _)
    .persist(StorageLevel.MEMORY_AND_DISK)

  /** (v, shape, total) collected to the driver for alias root sampling. */
  private val rootRows: Array[(Long, Int, Double)] = levelK
    .groupBy("v", "fs").agg(sum(col("cnt")).cast(DoubleType) as "t")
    .collect().map(r => (r.getLong(0), r.getInt(1), r.getDouble(2)))

  val totalsByShape: Map[Int, Double] =
    rootRows.groupBy(_._2).view.mapValues(_.map(_._3).sum).toMap

  private val aliasCache = collection.mutable.HashMap.empty[Option[Int], (Array[Long], Alias)]

  private def aliasFor(shape: Option[Int]): (Array[Long], Alias) =
    aliasCache.getOrElseUpdate(shape, {
      val rows = shape match {
        case None => rootRows.groupBy(_._1).view.mapValues(_.map(_._3).sum).toArray
        case Some(s) => rootRows.filter(_._2 == s).map(r => (r._1, r._3))
      }
      require(rows.nonEmpty, s"no colorful copies for shape $shape")
      (rows.map(_._1), Alias(rows.map(_._2)))
    })

  def sampleBatch(shape: Option[Int], b: Int): Seq[Long] =
    sampleBatchDF(shape, b).collect().map(_.getLong(1)).toSeq

  /** Returns (sid, gcode). */
  def sampleBatchDF(shape: Option[Int], b: Int): DataFrame = {
    import spark.implicits._
    batchNo += 1
    val base = seed + batchNo.toLong * 1000003L

    // 1. driver-side alias root draw
    val (verts, alias) = aliasFor(shape)
    val roots = Seq.tabulate(b)(i => (i.toLong, verts(alias.draw(rnd))))
    val rootsDF = spark.createDataset(roots).toDF("sid", "v")

    // 2. weighted treelet pick at the root
    val cand0 = shape match {
      case None    => levelK
      case Some(s) => levelK.where(col("fs") === s)
    }
    val picked = rootsDF
      .join(cand0, "v")
      .withColumn("key", -log(rand(base)) / col("cnt").cast(DoubleType))
      .groupBy("sid")
      .agg(min_by(struct(col("v"), col("tc")), col("key")) as "p")
      .select(col("sid"), lit(1) as "bid", col("p.v") as "v", col("p.tc") as "tc")

    // 3. expansion loop; finished singletons are collected to the driver
    // each round (≤ b·k tiny rows) so no lineage crosses an unpersist.
    var frontier = picked.persist(StorageLevel.MEMORY_AND_DISK)
    frontier.count()
    val resultRows = collection.mutable.ArrayBuffer.empty[(Long, Int, Long)]
    var round = 0
    while (!frontier.isEmpty) {
      round += 1
      resultRows ++= frontier.where(sizeUdf(col("tc")) === 1)
        .select(col("sid"), colorUdf(col("tc")) as "color", col("v"))
        .collect().map(r => (r.getLong(0), r.getInt(1), r.getLong(2)))

      val multi = frontier.where(sizeUdf(col("tc")) > 1)
      val expanded = multi
        .withColumn("sp", explode(splitsUdf(col("tc"))))
        .select(col("sid"), col("bid"), col("v"),
                col("sp._1") as "tc1", col("sp._2") as "tc2")
        .join(edges.select(col("src"), col("dst") as "u"), col("v") === col("src"))
        .join(inner.select(col("h") as "h1", col("v") as "v1", col("tc") as "jtc1",
                           col("cnt") as "w1"),
              col("v") === col("v1") && col("tc1") === col("jtc1") &&
                sizeUdf(col("tc1")) === col("h1"))
        .join(inner.select(col("h") as "h2", col("v") as "v2", col("tc") as "jtc2",
                           col("cnt") as "w2"),
              col("u") === col("v2") && col("tc2") === col("jtc2") &&
                sizeUdf(col("tc2")) === col("h2"))
        .withColumn("key",
          -log(rand(base + round)) /
            (col("w1").cast(DoubleType) * col("w2").cast(DoubleType)))
        .groupBy("sid", "bid")
        .agg(min_by(struct(col("v"), col("u"), col("tc1"), col("tc2")), col("key")) as "p")

      val next = expanded.select(col("sid"), col("bid"),
          explode(array(
            struct((col("bid") * 2) as "bid2", col("p.v") as "nv", col("p.tc1") as "ntc"),
            struct((col("bid") * 2 + 1) as "bid2", col("p.u") as "nv", col("p.tc2") as "ntc")
          )) as "e")
        .select(col("sid"), col("e.bid2") as "bid", col("e.nv") as "v", col("e.ntc") as "tc")
        .persist(StorageLevel.MEMORY_AND_DISK)
      next.count()
      frontier.unpersist()
      frontier = next
      if (round > k) throw new IllegalStateException("expansion did not terminate")
    }
    frontier.unpersist()

    // 4. induced subgraph: vertices slotted by color; pairs join edgePairs
    val results = spark.createDataset(resultRows.toSeq).toDF("sid", "color", "v")
    val va = results.select(col("sid"), col("color") as "ca", col("v") as "va")
    val vb = results.select(col("sid") as "sidb", col("color") as "cb", col("v") as "vb")
    val pairs = va.join(vb, col("sid") === col("sidb") && col("ca") < col("cb"))
      .select(col("sid"), col("ca"), col("cb"),
              least(col("va"), col("vb")) as "a", greatest(col("va"), col("vb")) as "b")
    val kk = k // local copy: capturing the field would serialize `this`
    val bitUdf = udf((i: Int, j: Int) => Graphlet.bit(i, j, kk))
    val present = pairs
      .join(edgePairs.withColumn("present", lit(1)), Seq("a", "b"), "left")
      .select(col("sid"),
              when(col("present").isNotNull, bitUdf(col("ca"), col("cb"))).otherwise(lit(0L)) as "bit")
    present.groupBy("sid")
      .agg(sum(col("bit")) as "mask")
      .select(col("sid"), canonUdf(col("mask").cast(LongType), lit(k)) as "gcode")
  }

  def close(): Unit = { levelK.unpersist(); inner.unpersist() }
}
