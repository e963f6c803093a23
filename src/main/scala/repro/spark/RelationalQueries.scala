package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Relational companions of the paper's primitives, expressed in the
  * DataFrame API. Each has a direct SQL mirror, so tests validate Spark's
  * answers against DuckDB via [[repro.Oracle.assertEquivalent]] — covering
  * the parts of the pipeline that relational semantics can reach (aggregates,
  * durations, pairwise co-occurrence), while the set-valued MCOS semantics is
  * covered by the BruteForce differential oracle.
  */
object RelationalQueries {

  /** Objects per class per frame — the §5.2 step-2a aggregate, relationally. */
  def classCounts(vr: DataFrame): DataFrame =
    vr.groupBy("vid", "fid", "cls")
      .agg(count(lit(1)).as("cnt"))

  /** For the window `(atFid - w, atFid]`: how many frames each object
    * appears in — the duration primitive behind the parameter `d`.
    */
  def windowDurations(vr: DataFrame, atFid: Int, w: Int): DataFrame =
    vr.filter(col("fid") > atFid - w && col("fid") <= atFid)
      .groupBy("vid", "oid")
      .agg(count(lit(1)).as("duration"))

  /** Singleton-MCOS query via SQL: objects appearing in at least `d` of the
    * last `w` frames at `atFid` — the relational projection of a
    * one-object co-occurrence query.
    */
  def objectsSatisfyingDuration(vr: DataFrame, atFid: Int, w: Int, d: Int): DataFrame =
    windowDurations(vr, atFid, w).filter(col("duration") >= d)

  /** Pairwise co-occurrence counts in the window `(atFid - w, atFid]`:
    * the `cooc` predicate of §2 for 2-element object sets, via self-join.
    */
  def coocPairs(vr: DataFrame, atFid: Int, w: Int): DataFrame = {
    val in = vr.filter(col("fid") > atFid - w && col("fid") <= atFid)
    val a = in.select(col("vid"), col("fid"), col("oid").as("oid1"))
    val b = in.select(col("vid"), col("fid"), col("oid").as("oid2"))
    a.join(b, Seq("vid", "fid"))
      .filter(col("oid1") < col("oid2"))
      .groupBy("vid", "oid1", "oid2")
      .agg(count(lit(1)).as("cooc_frames"))
  }

  /** Per-frame object-set cardinality — Obj/F's distribution. */
  def frameCardinalities(vr: DataFrame): DataFrame =
    vr.groupBy("vid", "fid").agg(count(lit(1)).as("n_objects"))
}
