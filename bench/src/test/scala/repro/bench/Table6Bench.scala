package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.video.Profiles

/** Table 6 — dataset statistics: the synthetic substitutes must land on the
  * published statistics of the six evaluation videos (the statistics are the
  * cost drivers of every other experiment).
  */
class Table6Bench extends AnyFunSuite {

  test("Table 6: dataset statistics, paper vs measured") {
    val header = Seq("Dataset", "Frames(p)", "Frames(m)", "Objects(p)", "Objects(m)",
                     "Obj/F(p)", "Obj/F(m)", "Occ/Obj(p)", "Occ/Obj(m)", "F/Obj(p)", "F/Obj(m)")
    val rows = BenchHarness.datasets.map { name =>
      val paper = Profiles.paperTable6(name)
      val got = BenchHarness.stream(name).stats
      Seq(name,
        paper.frames.toString, got.frames.toString,
        paper.objects.toString, got.objects.toString,
        f"${paper.objPerFrame}%.2f", f"${got.objPerFrame}%.2f",
        f"${paper.occPerObj}%.2f", f"${got.occPerObj}%.2f",
        f"${paper.framesPerObj}%.2f", f"${got.framesPerObj}%.2f")
    }
    BenchHarness.printTable("Table 6: Dataset Statistics (p=paper, m=measured)", header, rows)

    BenchHarness.datasets.foreach { name =>
      val paper = Profiles.paperTable6(name)
      val got = BenchHarness.stream(name).stats
      assert(got.frames === paper.frames)
      assert(math.abs(got.objects - paper.objects).toDouble / paper.objects <= 0.05)
      assert(math.abs(got.objPerFrame - paper.objPerFrame) / paper.objPerFrame <= 0.25)
      assert(math.abs(got.framesPerObj - paper.framesPerObj) / paper.framesPerObj <= 0.25)
      assert(math.abs(got.occPerObj - paper.occPerObj) / paper.occPerObj <= 0.35)
    }
  }
}
