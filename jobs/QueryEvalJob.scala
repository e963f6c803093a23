package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.WindowSpec
import repro.query.CnfQuery
import repro.spark.{McosBatch, VideoRelation}
import repro.video.{Profiles, SynthVideo}

/** spark-submit entrypoint: full §5 temporal-query evaluation over the
  * evaluation feeds.
  *
  * Usage: `spark-submit --class repro.jobs.QueryEvalJob repro.jar
  *         [profile=ALL] [method=SSG] [nQueries=50] [pruned=false] [w=300] [d=240]`
  */
object QueryEvalJob {
  def main(args: Array[String]): Unit = {
    val profile  = args.lift(0).getOrElse("ALL")
    val method   = args.lift(1).getOrElse("SSG")
    val nQueries = args.lift(2).map(_.toInt).getOrElse(50)
    val pruned   = args.lift(3).exists(_.toBoolean)
    val w = args.lift(4).map(_.toInt).getOrElse(300)
    val d = args.lift(5).map(_.toInt).getOrElse(240)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("query-eval").getOrCreate()
    try {
      val profiles =
        if (profile == "ALL") Profiles.all else Vector(Profiles.byName(profile))
      val streams = profiles.map(SynthVideo.generate(_))
      val events = VideoRelation.dataset(spark, streams)
      val queries =
        if (pruned) CnfQuery.geQueries(nQueries, nMin = 2, seed = 42)
        else CnfQuery.randomQueries(nQueries, seed = 42)
      val out = McosBatch.runQueries(events, WindowSpec(w, d), method, queries, pruned).cache()
      println(s"== Query evaluation: method=$method${if (pruned) "_O" else "_E"} " +
        s"#queries=$nQueries w=$w d=$d ==")
      out.groupBy("vid", "qid").count().orderBy("vid", "qid").show(100, truncate = false)
      println("sample matches:")
      out.orderBy("vid", "fid").show(20, truncate = false)
    } finally spark.stop()
  }
}
