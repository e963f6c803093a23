package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.WindowSpec
import repro.spark.{McosBatch, VideoRelation}
import repro.video.{Profiles, SynthVideo}

/** spark-submit entrypoint: MCOS generation over one (or all) evaluation
  * feeds.
  *
  * Usage: `spark-submit --class repro.jobs.McosGenJob repro.jar
  *         [profile=ALL] [method=SSG] [w=300] [d=240]`
  */
object McosGenJob {
  def main(args: Array[String]): Unit = {
    val profile = args.lift(0).getOrElse("ALL")
    val method  = args.lift(1).getOrElse("SSG")
    val w = args.lift(2).map(_.toInt).getOrElse(300)
    val d = args.lift(3).map(_.toInt).getOrElse(240)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("mcos-gen").getOrCreate()
    try {
      val profiles =
        if (profile == "ALL") Profiles.all else Vector(Profiles.byName(profile))
      val streams = profiles.map(SynthVideo.generate(_))
      val events = VideoRelation.dataset(spark, streams)
      val out = McosBatch.run(events, WindowSpec(w, d), method).cache()
      println(s"== MCOS generation: method=$method w=$w d=$d ==")
      out.groupBy("vid").count().orderBy("vid").show(50, truncate = false)
      println("sample results:")
      out.orderBy("vid", "fid").show(20, truncate = false)
    } finally spark.stop()
  }
}
