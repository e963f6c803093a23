package repro.query

import scala.collection.mutable
import repro.core.{McosGenerator, McosResult, WindowSpec}
import repro.core.ObjSet
import repro.core.ObjSet.ObjSet

/** One query match: at frame `fid`, query `qid` is TRUE on the MCOS `objects`
  * whose window frame set is `frames` (the paper's produced result, §5.2).
  */
final case class QueryMatch(fid: Int, qid: Int, objects: ObjSet, frames: Vector[Int])

/** The full §5 evaluation pipeline: MCOS generation feeding CNFEvalE.
  *
  * Variants map to the paper's §6.3 method names via `method` ∈
  * {NAIVE, MFS, SSG} and `pruneByEval`:
  *
  *  - `NAIVE_E` / `MFS_E` / `SSG_E` — `pruneByEval = false`: every satisfied
  *    MCOS is aggregated by class and pushed through the inverted index.
  *  - `MFS_O` / `SSG_O` — `pruneByEval = true`: additionally, when the query
  *    set is ≥-only (Proposition 1), a freshly generated state whose MCOS
  *    fails every query is terminated — never materialized — shrinking the
  *    state space itself. Verdicts are memoized per object set.
  *
  * Objects whose class no query mentions are dropped on entry (§3: "objects
  * with class not requested by any query may be dropped from VR").
  */
final class QueryPipeline(val queries: Vector[CnfQuery],
                          val spec: WindowSpec,
                          method: String,
                          pruneByEval: Boolean = false) extends Serializable {

  private val index = CnfEvalE(queries)
  private val relevant: Set[String] = queries.flatMap(_.labels).toSet
  private val classOf = mutable.HashMap.empty[Int, String]
  private val verdictCache = mutable.HashMap.empty[ObjSet, Boolean]

  /** ≥-only query sets admit creation-time termination (Proposition 1). */
  val pruningActive: Boolean = pruneByEval && queries.nonEmpty && queries.forall(_.geOnly)

  private val generator: McosGenerator = {
    val terminate: Option[ObjSet => Boolean] =
      if (pruningActive) Some(ids => !verdictCache.getOrElseUpdate(ids, index.anyMatch(aggregates(ids))))
      else None
    McosGenerator(method, spec, terminate)
  }

  /** Class-count aggregates of one MCOS (step 2a of §5.2). */
  def aggregates(ids: ObjSet): Map[String, Int] = {
    val counts = mutable.HashMap.empty[String, Int]
    ids.foreach { oid =>
      classOf.get(oid).foreach(l => counts.update(l, counts.getOrElse(l, 0) + 1))
    }
    counts.toMap
  }

  /** Feed one frame of the VR relation; emits all (query, MCOS) matches in
    * the window ending at `fid`.
    */
  def processFrame(fid: Int, objects: Seq[(Int, String)]): Vector[QueryMatch] = {
    val kept = objects.filter { case (_, cls) => relevant.contains(cls) }
    kept.foreach { case (oid, cls) => classOf.update(oid, cls) }
    val results = generator.processFrame(fid, ObjSet.from(kept.map(_._1)))
    evaluate(results)
  }

  /** Step 2 of §5.2 over a Result State Set. */
  def evaluate(results: Vector[McosResult]): Vector[QueryMatch] =
    results.flatMap { r =>
      index.matching(aggregates(r.objects)).toVector.sorted
        .map(qid => QueryMatch(r.fid, qid, r.objects, r.frames))
    }

  def stateCount: Int = generator.stateCount
  def intersections: Long = generator.intersections
}
