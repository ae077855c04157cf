package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.collection.mutable

/** Distributed core decomposition (Definitions 2–4) as an iterative
  * DataFrame peel — the GraphX-style vertex program expressed with the
  * DataFrame API.
  *
  * Phase `k` repeatedly deletes vertices of degree `< k`; a vertex deleted
  * in phase `k` has core number `k − 1`, and the graph left standing after
  * phase `k` is exactly the k-core. The degeneracy λ is the largest core
  * number. Each round is materialised with `localCheckpoint` so lineage
  * stays bounded across the fix-point loop.
  */
object DistributedCore {

  final case class CoreResult(cores: Map[Long, Int], degeneracy: Int)

  def coreNumbers(spark: SparkSession, edges: DataFrame): CoreResult = {
    var remaining = GraphOps.canonicalEdges(edges).localCheckpoint(true)
    val cores = mutable.Map.empty[Long, Int]
    var k = 1
    var degeneracy = 0
    var left = remaining.count()
    def liveVertices(): Set[Long] =
      if (left == 0) Set.empty
      else GraphOps.degrees(remaining).select(col("v")).collect().map(_.getLong(0)).toSet
    var live = liveVertices()
    while (left > 0) {
      var changed = true
      while (changed && left > 0) {
        val deg = GraphOps.degrees(remaining)
        val toRemove = deg.where(col("degree") < k).select(col("v")).collect().map(_.getLong(0))
        if (toRemove.isEmpty) changed = false
        else {
          toRemove.foreach(v => cores(v) = k - 1)
          val rm = spark.createDataFrame(
            spark.sparkContext.parallelize(toRemove.toSeq.map(org.apache.spark.sql.Row(_)), 4),
            org.apache.spark.sql.types.StructType(Seq(
              org.apache.spark.sql.types.StructField("rv", org.apache.spark.sql.types.LongType))))
          remaining = remaining
            .join(rm, remaining("src") === rm("rv"), "left_anti")
            .join(rm, remaining("dst") === rm("rv"), "left_anti")
            .localCheckpoint(true)
          left = remaining.count()
          // Vertices isolated by the removals vanish from the edge view:
          // their residual degree hit 0 < k, so their core is also k − 1.
          val nowLive = liveVertices()
          (live -- nowLive).foreach(v => if (!cores.contains(v)) cores(v) = k - 1)
          live = nowLive
        }
      }
      if (left > 0) { degeneracy = k; k += 1 }
    }
    // Vertices never removed do not exist (edges define vertices), so every
    // vertex got a core number. λ is the last k whose k-core was non-empty.
    CoreResult(cores.toMap, degeneracy)
  }

  /** Just the degeneracy λ. */
  def degeneracy(spark: SparkSession, edges: DataFrame): Int =
    coreNumbers(spark, edges).degeneracy
}
