package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ObjSet.ObjSet

/** Trace-fidelity tests against the paper's running example (§2, Tables 1–2):
  * the 5-frame video ⟨{B},{ABC},{ABDF},{ABCF},{ABD}⟩ with w=4, d=3.
  */
class PaperExampleSpec extends AnyFunSuite {
  private val A = 0; private val B = 1; private val C = 2
  private val D = 3; private val F = 5

  private def s(ids: Int*): ObjSet = ObjSet.of(ids: _*)

  private val stream = Vector(
    Frame(0, s(B)),
    Frame(1, s(A, B, C)),
    Frame(2, s(A, B, D, F)),
    Frame(3, s(A, B, C, F)),
    Frame(4, s(A, B, D)),
  )
  private val spec = WindowSpec(w = 4, d = 3)

  private def expected: Vector[Set[(ObjSet, Vector[Int])]] = Vector(
    Set.empty,                                  // frame 0: fewer than d frames
    Set.empty,                                  // frame 1
    Set(s(B) -> Vector(0, 1, 2)),               // frame 2: EXP = {B}
    Set(s(B) -> Vector(0, 1, 2, 3),             // frame 3: EXP = {B}, {AB}
        s(A, B) -> Vector(1, 2, 3)),
    Set(s(A, B) -> Vector(1, 2, 3, 4)),         // frame 4: only {AB}; {B} invalid
  )

  private def results(gen: McosGenerator): Vector[Set[(ObjSet, Vector[Int])]] =
    stream.map(f => gen.processFrame(f.fid, f.objects).map(r => (r.objects, r.frames)).toSet)

  test("NAIVE reproduces the EXP column of Table 1") {
    assert(results(new NaiveGenerator(spec)) === expected)
  }

  test("MFS reproduces the EXP column of Table 1") {
    assert(results(new MfsGenerator(spec)) === expected)
  }

  test("SSG reproduces the EXP column of Table 1") {
    assert(results(new SsgGenerator(spec)) === expected)
  }

  test("BruteForce reference agrees with the EXP column of Table 1") {
    val got = BruteForce.run(stream, spec).map(_.map(r => (r.objects, r.frames)))
    assert(got === expected)
  }

  test("MFS maintains the states of Table 2, including marks") {
    val gen = new MfsGenerator(spec)
    // frame 0: ({B},{*0})
    gen.processFrame(0, s(B))
    assert(gen.snapshot === Map(s(B) -> (Vector(0), 0)))
    // frame 1: ({B},{*0,1}); ({ABC},{*1})
    gen.processFrame(1, s(A, B, C))
    assert(gen.snapshot === Map(
      s(B) -> (Vector(0, 1), 0),
      s(A, B, C) -> (Vector(1), 1)))
    // frame 2: ({B},{*0,1,2}); ({ABC},{*1}); ({AB},{*1,2}); ({ABDF},{*2})
    gen.processFrame(2, s(A, B, D, F))
    assert(gen.snapshot === Map(
      s(B) -> (Vector(0, 1, 2), 0),
      s(A, B, C) -> (Vector(1), 1),
      s(A, B) -> (Vector(1, 2), 1),
      s(A, B, D, F) -> (Vector(2), 2)))
    // frame 3 adds ({ABC},{*1,3}); ({AB},{*1,2,3}); ({ABF},{*2,3}); ({ABCF},{*3})
    gen.processFrame(3, s(A, B, C, F))
    assert(gen.snapshot === Map(
      s(B) -> (Vector(0, 1, 2, 3), 0),
      s(A, B, C) -> (Vector(1, 3), 1),
      s(A, B) -> (Vector(1, 2, 3), 1),
      s(A, B, D, F) -> (Vector(2), 2),
      s(A, B, F) -> (Vector(2, 3), 2),
      s(A, B, C, F) -> (Vector(3), 3)))
    // frame 4: {B} has lost every key frame (0 expired) and is pruned; {AB}'s
    // marked set becomes {*1,2,*3,4} — best mark 3, inherited via the
    // principal {ABCF}, with 2 correctly left unmarked.
    gen.processFrame(4, s(A, B, D))
    val snap = gen.snapshot
    assert(!snap.contains(s(B)), "invalid state {B} must be pruned at frame 4")
    assert(snap(s(A, B)) === (Vector(1, 2, 3, 4), 3))
    assert(snap(s(A, B, D)) === (Vector(2, 4), 4))
    assert(snap(s(A, B, C)) === (Vector(1, 3), 1))
    assert(snap(s(A, B, C, F)) === (Vector(3), 3))
    assert(snap(s(A, B, F)) === (Vector(2, 3), 2))
    assert(snap(s(A, B, D, F)) === (Vector(2), 2))
  }

  test("SSG maintains the same states as MFS on the Table 2 trace") {
    val mfs = new MfsGenerator(spec)
    val ssg = new SsgGenerator(spec)
    stream.foreach { f =>
      mfs.processFrame(f.fid, f.objects)
      ssg.processFrame(f.fid, f.objects)
      assert(ssg.snapshot === mfs.snapshot, s"diverged at frame ${f.fid}")
    }
  }

  test("SSG edges respect Property 1 (child strictly contained in parent)") {
    val ssg = new SsgGenerator(spec)
    stream.foreach { f =>
      ssg.processFrame(f.fid, f.objects)
      ssg.edges.foreach { case (p, cs) =>
        cs.foreach(c => assert(c.subsetOf(p) && c != p, s"bad edge $p -> $c"))
      }
    }
  }

  test("SSG edges respect Property 2 (no child contained in a sibling)") {
    val ssg = new SsgGenerator(spec)
    stream.foreach { f =>
      ssg.processFrame(f.fid, f.objects)
      ssg.edges.foreach { case (p, cs) =>
        for (a <- cs; b <- cs if a != b)
          assert(!a.subsetOf(b), s"siblings violate Property 2 under $p: $a ⊆ $b")
      }
    }
  }

  test("relaxing d to 2 admits {ABC}, {ABD}, {ABF} as §2 describes") {
    val spec2 = WindowSpec(w = 5, d = 2)
    val gen = new MfsGenerator(spec2)
    var last: Vector[McosResult] = Vector.empty
    stream.foreach(f => last = gen.processFrame(f.fid, f.objects))
    val sets = last.map(_.objects).toSet
    assert(sets.contains(s(A, B, C)))
    assert(sets.contains(s(A, B, D)))
    assert(sets.contains(s(A, B, F)))
    assert(sets.contains(s(A, B)))
    assert(sets.contains(s(B)))
  }
}
