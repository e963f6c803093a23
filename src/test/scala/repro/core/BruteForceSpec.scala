package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.RandomizedSpec
import repro.core.ObjSet.ObjSet

/** The reference implementation must itself satisfy the paper's definitions:
  * every emitted set is a COS of its frame set (Definition 1), maximal
  * (Definition 2), satisfies the duration, and nothing maximal is missed.
  */
class BruteForceSpec extends AnyFunSuite with RandomizedSpec {

  override def cases: Int = 80

  private def randomWindow(rnd: scala.util.Random): (Vector[Frame], WindowSpec) = {
    val n = 2 + rnd.nextInt(8)
    val len = 3 + rnd.nextInt(10)
    val frames = Vector.tabulate(len)(fid =>
      Frame(fid, ObjSet.from((0 until n).filter(_ => rnd.nextBoolean()))))
    val w = len // whole stream as one window
    (frames, WindowSpec(w, 1 + rnd.nextInt(math.min(3, w))))
  }

  test("every result is a co-occurrence object set of its frame set") {
    forSeeds() { rnd =>
      val (frames, spec) = randomWindow(rnd)
      val byFid = frames.map(f => f.fid -> f.objects).toMap
      BruteForce.mcosAt(frames.last.fid, frames, spec).foreach { r =>
        r.frames.foreach(f => assert(r.objects.subsetOf(byFid(f)), s"$r not a COS"))
      }
    }
  }

  test("every result's frame set is the full extent of its object set") {
    forSeeds(0xB1) { rnd =>
      val (frames, spec) = randomWindow(rnd)
      BruteForce.mcosAt(frames.last.fid, frames, spec).foreach { r =>
        val extent = frames.collect {
          case f if f.objects.nonEmpty && r.objects.subsetOf(f.objects) => f.fid
        }
        assert(r.frames === extent, s"frame set of $r is not the extent")
      }
    }
  }

  test("every result is maximal: no strict superset co-occurs in all its frames") {
    forSeeds(0xB2) { rnd =>
      val (frames, spec) = randomWindow(rnd)
      val byFid = frames.map(f => f.fid -> f.objects).toMap
      BruteForce.mcosAt(frames.last.fid, frames, spec).foreach { r =>
        val closure = r.frames.map(byFid).reduce((a: ObjSet, b: ObjSet) => a & b)
        assert(closure === r.objects, s"$r is not maximal (closure $closure)")
      }
    }
  }

  test("completeness: the object set of every frame subset with >= d frames is covered") {
    forSeeds(0xB3) { rnd =>
      val (frames, spec) = randomWindow(rnd)
      val results = BruteForce.mcosAt(frames.last.fid, frames, spec)
      val nonEmpty = frames.filter(_.objects.nonEmpty)
      // For every single frame's object set S: closure(S) with extent >= d
      // must appear among the results.
      nonEmpty.foreach { f =>
        val extent = nonEmpty.filter(g => f.objects.subsetOf(g.objects)).map(_.fid)
        if (extent.size >= spec.d)
          assert(results.exists(r => r.objects == f.objects ||
                   (f.objects.subsetOf(r.objects) && r.frames == extent.toVector)),
            s"closure of frame ${f.fid} missing")
      }
    }
  }

  test("duration filters exactly") {
    val frames = Vector(
      Frame(0, ObjSet.of(1, 2)),
      Frame(1, ObjSet.of(1, 2)),
      Frame(2, ObjSet.of(1)),
    )
    val r1 = BruteForce.mcosAt(2, frames, WindowSpec(3, 3))
    assert(r1.map(r => (r.objects, r.frames)) === Set((ObjSet.of(1), Vector(0, 1, 2))))
    val r2 = BruteForce.mcosAt(2, frames, WindowSpec(3, 2))
    assert(r2.map(r => (r.objects, r.frames)) ===
      Set((ObjSet.of(1), Vector(0, 1, 2)), (ObjSet.of(1, 2), Vector(0, 1))))
  }

  test("empty windows produce no results") {
    assert(BruteForce.mcosAt(5, Vector.empty, WindowSpec(3, 1)) === Set.empty)
    assert(BruteForce.mcosAt(5, Vector(Frame(5, ObjSet.empty)), WindowSpec(3, 1)) === Set.empty)
  }

  test("run slides the window: frames outside (fid-w, fid] are ignored") {
    val frames = Vector(
      Frame(0, ObjSet.of(1)),
      Frame(1, ObjSet.of(1)),
      Frame(2, ObjSet.of(2)),
      Frame(3, ObjSet.of(2)),
    )
    val out = BruteForce.run(frames, WindowSpec(2, 2))
    assert(out(1).map(r => (r.objects, r.frames)) === Set((ObjSet.of(1), Vector(0, 1))))
    assert(out(2) === Set.empty) // window {1,2}: no 2-frame co-occurrence
    assert(out(3).map(r => (r.objects, r.frames)) === Set((ObjSet.of(2), Vector(2, 3))))
  }
}
