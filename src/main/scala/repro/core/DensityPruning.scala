package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.embed.VecOps

/** Pruning-phase configuration (paper §III-D).
  *
  * @param eps    ε, the neighborhood radius (Euclidean distance between
  *               unit-normalised entity embeddings)
  * @param minPts MinPts — neighbors (incl. self, distance 0 < ε) needed for
  *               an entity to be a core entity; the paper uses 2
  */
case class PruneConfig(eps: Double = 0.9, minPts: Int = 2)

/** Density-based pruning (Definitions 3–5, Algorithm 4).
  *
  * Every candidate tuple from the merging phase is pruned independently:
  * entities are classified as core (≥ MinPts entities of the same tuple
  * strictly within ε, Eq. 11–12), reachable (non-core with a core entity at
  * distance ≤ ε, Eq. 13–14) or outlier (neither); outliers are removed and
  * the survivors form the refined tuple. Expressed as explode → per-tuple
  * self-join → groupBy, so Spark partitioning delivers the paper's
  * tuple-level parallelism for free.
  */
object DensityPruning {

  /** Per-entity classification — exposed for tests and analysis.
    *
    * @param items item tables from merging: (id, members: Array[Long], …)
    * @param emb   per-entity embeddings: (eid, vec)
    * @return (tid, eid, kind) with kind ∈ {core, reachable, outlier}, one
    *         row per entity of every multi-member tuple
    */
  def classify(items: DataFrame, emb: DataFrame, cfg: PruneConfig): DataFrame = {
    val mem = items
      .filter(size(col("members")) >= 2)
      .select(col("id") as "tid", explode(col("members")) as "eid")
      .join(emb, Seq("eid"))
    val x = mem.select(col("tid"), col("eid") as "e1", col("vec") as "v1")
    val y = mem.select(col("tid"), col("eid") as "e2", col("vec") as "v2")
    val dists = x.join(y, Seq("tid"))
      .withColumn("dist", VecOps.euclideanDistCol(col("v1"), col("v2")))
      .select("tid", "e1", "e2", "dist")

    // Eq. 11–12: core iff |{e' : dist(e,e') < ε}| ≥ MinPts (self included).
    val core = dists
      .filter(col("dist") < cfg.eps)
      .groupBy(col("tid"), col("e1") as "eid")
      .agg(count("*") as "n")
      .withColumn("isCore", col("n") >= cfg.minPts)
      .select("tid", "eid", "isCore")

    // Eq. 13–14: reachable iff some *core* entity lies at distance ≤ ε.
    val coreSet = core.filter(col("isCore")).select(col("tid"), col("eid") as "e2")
    val reach = dists
      .filter(col("dist") <= cfg.eps)
      .join(coreSet, Seq("tid", "e2"))
      .select(col("tid"), col("e1") as "eid")
      .distinct()
      .withColumn("isReach", lit(true))

    mem.select("tid", "eid")
      .join(core, Seq("tid", "eid"), "left")
      .join(reach, Seq("tid", "eid"), "left")
      .withColumn("kind",
        when(coalesce(col("isCore"), lit(false)), "core")
          .when(coalesce(col("isReach"), lit(false)), "reachable")
          .otherwise("outlier"))
      .select("tid", "eid", "kind")
  }

  /** Algorithm 4 applied to every tuple: drop outliers, keep tuples that
    * still have ≥ 2 members.
    *
    * @return refined tuples as (members: Array[Long]) rows
    */
  def prune(items: DataFrame, emb: DataFrame, cfg: PruneConfig): DataFrame =
    classify(items, emb, cfg)
      .filter(col("kind") =!= "outlier")
      .groupBy("tid")
      .agg(sort_array(collect_list("eid")) as "members")
      .filter(size(col("members")) >= 2)
      .select("members")
}
