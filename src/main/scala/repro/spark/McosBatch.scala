package repro.spark

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.{McosGenerator, WindowSpec}
import repro.core.ObjSet
import repro.query.{CnfQuery, QueryPipeline}
import repro.video.VRRow

/** One satisfied MCOS emitted at frame `fid` of feed `vid`. */
final case class McosRow(vid: String, fid: Int, objects: Seq[Int], frames: Seq[Int])

/** One (query, MCOS) match emitted at frame `fid` of feed `vid`. */
final case class MatchRow(vid: String, fid: Int, qid: Int, objects: Seq[Int], frames: Seq[Int])

/** Batch MCOS generation on Spark: each feed's VR rows are grouped, replayed
  * in fid order through the chosen sequential generator, and the per-frame
  * Result State Sets are emitted as rows. Parallelism is across feeds — the
  * algorithms themselves are inherently order-dependent per feed (§4), so
  * this is the faithful dataflow layering (see DESIGN.md §4).
  */
object McosBatch {

  /** Replay rows (any order) of one feed through a fresh generator. */
  private[spark] def replay(vid: String, rows: Iterator[VRRow],
                            spec: WindowSpec, method: String): Iterator[McosRow] = {
    val gen = McosGenerator(method, spec)
    rows.toVector
      .groupBy(_.fid).toVector.sortBy(_._1)
      .iterator
      .flatMap { case (fid, rs) =>
        gen.processFrame(fid, ObjSet.from(rs.map(_.oid)))
          .map(r => McosRow(vid, fid, r.objects.toSeq, r.frames))
      }
  }

  /** Replay one feed through the full §5 query pipeline. */
  private[spark] def replayQueries(vid: String, rows: Iterator[VRRow],
                                   spec: WindowSpec, method: String,
                                   queries: Vector[CnfQuery],
                                   pruneByEval: Boolean): Iterator[MatchRow] = {
    val pipe = new QueryPipeline(queries, spec, method, pruneByEval)
    rows.toVector
      .groupBy(_.fid).toVector.sortBy(_._1)
      .iterator
      .flatMap { case (fid, rs) =>
        pipe.processFrame(fid, rs.map(r => (r.oid, r.cls)))
          .map(m => MatchRow(vid, fid, m.qid, m.objects.toSeq, m.frames))
      }
  }

  /** MCOS generation across all feeds in `events`. */
  def run(events: Dataset[VRRow], spec: WindowSpec, method: String): Dataset[McosRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    events.groupByKey(_.vid).flatMapGroups((vid, it) => replay(vid, it, spec, method))
  }

  /** Full query evaluation across all feeds in `events`. */
  def runQueries(events: Dataset[VRRow], spec: WindowSpec, method: String,
                 queries: Vector[CnfQuery], pruneByEval: Boolean = false): Dataset[MatchRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    events.groupByKey(_.vid)
      .flatMapGroups((vid, it) => replayQueries(vid, it, spec, method, queries, pruneByEval))
  }
}
