package repro.spark

import org.apache.spark.sql.{Dataset, Encoder, Encoders}
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}
import repro.core.{McosGenerator, WindowSpec}
import repro.core.ObjSet
import repro.video.VRRow

/** Incremental MCOS generation as a Structured Streaming stateful operator —
  * the distributed form of the paper's MCOS Generation module (§3): object
  * streams arrive as a streaming Dataset of VR rows, and each feed's
  * generator (MFS or SSG state maintenance, with all their pruning) lives as
  * group state inside `flatMapGroupsWithState`, emitting the Result State Set
  * for every processed frame.
  *
  * Frames are replayed in fid order within each micro-batch; fids must not
  * regress across batches (the upstream detection layer is ordered). The
  * generator state is carried via Java serialization — the generators are
  * plain serializable state machines by construction.
  */
object McosStreaming {

  /** Serializable per-feed operator state: the live generator + a watermark
    * of the last processed frame (late rows are dropped, matching the
    * paper's in-order stream assumption).
    */
  final case class FeedState(gen: McosGenerator, var lastFid: Int) extends Serializable

  def run(events: Dataset[VRRow], spec: WindowSpec, method: String): Dataset[McosRow] = {
    val spark = events.sparkSession
    import spark.implicits._
    implicit val stateEnc: Encoder[FeedState] = Encoders.javaSerialization[FeedState]

    events.groupByKey(_.vid).flatMapGroupsWithState[FeedState, McosRow](
      OutputMode.Append(), GroupStateTimeout.NoTimeout()) {
      (vid: String, rows: Iterator[VRRow], state: GroupState[FeedState]) =>
        val st = state.getOption.getOrElse(FeedState(McosGenerator(method, spec), -1))
        val out = rows.toVector
          .groupBy(_.fid).toVector.sortBy(_._1)
          .iterator
          .filter(_._1 > st.lastFid)
          .flatMap { case (fid, rs) =>
            st.lastFid = fid
            st.gen.processFrame(fid, ObjSet.from(rs.map(_.oid)))
              .map(r => McosRow(vid, fid, r.objects.toSeq, r.frames))
          }
          .toVector
        state.update(st)
        out.iterator
    }
  }
}
