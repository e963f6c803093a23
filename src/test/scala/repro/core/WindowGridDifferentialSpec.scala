package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core.ObjSet.ObjSet

/** Exhaustive (w, d) grid: for every window size 2..8 and every legal
  * duration, each generator is differentially tested against BruteForce on
  * randomized occlusion streams. One registered test per (method, w, d) cell
  * keeps failures precisely attributable.
  */
class WindowGridDifferentialSpec extends AnyFunSuite {

  private val seedsPerCell = 12

  private def stream(rnd: Random): Vector[Frame] = {
    val nObjects = 2 + rnd.nextInt(6)
    val length = 8 + rnd.nextInt(20)
    val visible = Array.fill(nObjects)(rnd.nextBoolean())
    Vector.tabulate(length) { fid =>
      (0 until nObjects).foreach { o =>
        if (rnd.nextInt(4) == 0) visible(o) = !visible(o)
      }
      Frame(fid, ObjSet.from((0 until nObjects).filter(visible)))
    }
  }

  private def norm(rs: Iterable[McosResult]): Set[(ObjSet, Vector[Int])] =
    rs.map(r => (r.objects, r.frames)).toSet

  for {
    method <- Seq("NAIVE", "MFS", "SSG")
    w <- 2 to 8
    d <- 1 to w
  } test(s"$method ≡ BruteForce at w=$w d=$d") {
    val spec = WindowSpec(w, d)
    val master = new Random(w * 131 + d * 17)
    (0 until seedsPerCell).foreach { i =>
      val rnd = new Random(master.nextLong())
      val frames = stream(rnd)
      val gen = McosGenerator(method, spec)
      val exp = BruteForce.run(frames, spec)
      frames.zipWithIndex.foreach { case (f, j) =>
        val got = norm(gen.processFrame(f.fid, f.objects))
        assert(got === norm(exp(j)), s"case $i frame ${f.fid}")
      }
    }
  }
}
