package repro.spark

import org.apache.spark.sql.Encoder
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core.{McosGenerator, WindowSpec}
import repro.core.ObjSet
import repro.query.CnfQuery
import repro.video.{Profiles, SynthVideo, VideoProfile, VRRow}

/** The Spark dataflow must be a faithful host for the sequential algorithms:
  * batch `flatMapGroups` ≡ the in-process generator, streaming
  * `flatMapGroupsWithState` ≡ batch across arbitrary micro-batch splits, and
  * multiple feeds stay isolated.
  */
class McosSparkSpec extends SparkSpec {

  private val spec = WindowSpec(w = 30, d = 18)

  private lazy val profA = VideoProfile("A", 120, 25, 20, 2.0, 4.0, Profiles.V1.classWeights, 11L)
  private lazy val profB = VideoProfile("B", 100, 30, 12, 1.5, 3.0, Profiles.M1.classWeights, 12L)
  private lazy val streamA = SynthVideo.generate(profA)
  private lazy val streamB = SynthVideo.generate(profB)

  /** Expected rows via the in-process generator, fed only non-empty frames
    * (VR has no rows for empty frames, so neither does the Spark path).
    */
  private def localRows(stream: repro.video.VideoStream, method: String): Set[McosRow] = {
    val gen = McosGenerator(method, spec)
    stream.frames.zipWithIndex.collect { case (objs, fid) if objs.nonEmpty =>
      gen.processFrame(fid, ObjSet.from(objs.map(_._1)))
        .map(r => McosRow(stream.name, fid, r.objects.toSeq, r.frames))
    }.flatten.toSet
  }

  private def normalize(rows: Seq[McosRow]): Set[McosRow] =
    rows.map(r => r.copy(objects = r.objects.sorted, frames = r.frames.sorted)).toSet

  Seq("NAIVE", "MFS", "SSG").foreach { method =>
    test(s"batch $method on Spark ≡ in-process generator, per feed") {
      val events = VideoRelation.dataset(spark, Seq(streamA, streamB))
      val got = McosBatch.run(events, spec, method).collect().toSeq
      val want = localRows(streamA, method) ++ localRows(streamB, method)
      assert(normalize(got) === want)
    }
  }

  test("streaming MFS ≡ batch MFS across micro-batch splits") {
    import spark.implicits._
    val enc: Encoder[VRRow] = newProductEncoder[VRRow]
    val ms = MemoryStream[VRRow](enc, spark)
    val out = McosStreaming.run(ms.toDS(), spec, "MFS")
    val query = out.writeStream.format("memory").queryName("mcos_stream")
      .outputMode("append").start()
    try {
      // Three uneven micro-batches, in fid order.
      val rows = streamA.rows
      val cut1 = rows.count(_.fid < 40)
      val cut2 = rows.count(_.fid < 77)
      ms.addData(rows.take(cut1)); query.processAllAvailable()
      ms.addData(rows.slice(cut1, cut2)); query.processAllAvailable()
      ms.addData(rows.drop(cut2)); query.processAllAvailable()
      val got = spark.table("mcos_stream").as[McosRow].collect().toSeq
      assert(normalize(got) === localRows(streamA, "MFS"))
    } finally query.stop()
  }

  test("streaming SSG keeps graph state alive across many tiny batches") {
    import spark.implicits._
    val enc: Encoder[VRRow] = newProductEncoder[VRRow]
    val ms = MemoryStream[VRRow](enc, spark)
    val out = McosStreaming.run(ms.toDS(), spec, "SSG")
    val query = out.writeStream.format("memory").queryName("ssg_stream")
      .outputMode("append").start()
    try {
      streamB.rows.groupBy(_.fid).toSeq.sortBy(_._1).grouped(7).foreach { chunk =>
        ms.addData(chunk.flatMap(_._2))
        query.processAllAvailable()
      }
      val got = spark.table("ssg_stream").as[McosRow].collect().toSeq
      assert(normalize(got) === localRows(streamB, "SSG"))
    } finally query.stop()
  }

  test("query evaluation on Spark matches the in-process pipeline") {
    import spark.implicits._
    val queries = CnfQuery.randomQueries(8, seed = 5, maxN = 3)
    val events = VideoRelation.dataset(spark, Seq(streamA, streamB))
    val got = McosBatch.runQueries(events, spec, "SSG", queries).collect().toSeq
    val want = Seq(streamA, streamB).flatMap { s =>
      val pipe = new repro.query.QueryPipeline(queries, spec, "SSG")
      s.frames.zipWithIndex.collect { case (objs, fid) if objs.nonEmpty =>
        pipe.processFrame(fid, objs)
          .map(m => MatchRow(s.name, fid, m.qid, m.objects.toSeq, m.frames))
      }.flatten
    }.toSet
    assert(got.map(r => r.copy(objects = r.objects.sorted, frames = r.frames.sorted)).toSet === want)
  }

  test("feeds are isolated: per-feed results never mix object ids across vids") {
    val events = VideoRelation.dataset(spark, Seq(streamA, streamB))
    val rows = McosBatch.run(events, spec, "MFS").collect()
    val idsA = streamA.rows.map(_.oid).toSet
    val idsB = streamB.rows.map(_.oid).toSet
    rows.foreach { r =>
      val pool = if (r.vid == "A") idsA else idsB
      assert(r.objects.forall(pool.contains), s"row $r leaks ids across feeds")
    }
  }
}
