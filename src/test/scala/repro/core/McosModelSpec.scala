package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ObjSet.ObjSet

/** Model-level unit tests: window arithmetic, factory dispatch, ObjSet ops. */
class McosModelSpec extends AnyFunSuite {

  test("WindowSpec rejects non-positive windows") {
    assertThrows[IllegalArgumentException](WindowSpec(0, 1))
    assertThrows[IllegalArgumentException](WindowSpec(-3, 1))
  }

  test("WindowSpec rejects durations outside [1, w]") {
    assertThrows[IllegalArgumentException](WindowSpec(5, 0))
    assertThrows[IllegalArgumentException](WindowSpec(5, 6))
    WindowSpec(5, 5); WindowSpec(5, 1) // boundaries are legal
  }

  test("winStart spans exactly w frames") {
    val spec = WindowSpec(10, 3)
    assert(spec.winStart(9) === 0)
    assert(spec.winStart(100) === 91)
    // frames winStart..fid inclusive = w frames
    assert(100 - spec.winStart(100) + 1 === 10)
  }

  test("factory dispatches by method name, case-insensitively") {
    val spec = WindowSpec(4, 2)
    assert(McosGenerator("naive", spec).isInstanceOf[NaiveGenerator])
    assert(McosGenerator("Mfs", spec).isInstanceOf[MfsGenerator])
    assert(McosGenerator("SSG", spec).isInstanceOf[SsgGenerator])
  }

  test("factory rejects unknown methods") {
    assertThrows[IllegalArgumentException](McosGenerator("BOGUS", WindowSpec(2, 1)))
  }

  test("ObjSet helpers build the expected bitsets") {
    assert(ObjSet.of(1, 5, 3) === scala.collection.immutable.BitSet(1, 3, 5))
    assert(ObjSet.from(Seq(2, 2, 4)) === scala.collection.immutable.BitSet(2, 4))
    assert(ObjSet.empty.isEmpty)
  }

  test("ObjSet intersection is the hot-path operation used everywhere") {
    val a: ObjSet = ObjSet.of(1, 2, 3, 64, 130)
    val b: ObjSet = ObjSet.of(2, 64, 131)
    assert((a & b) === ObjSet.of(2, 64))
    assert((a & ObjSet.empty).isEmpty)
  }

  test("McosResult prints objects and frames compactly") {
    val r = McosResult(7, ObjSet.of(1, 2), Vector(5, 6, 7))
    assert(r.toString === "McosResult(7, {1,2}, [5,6,7])")
  }

  test("generators expose monotone intersection counters") {
    val spec = WindowSpec(3, 1)
    Seq("NAIVE", "MFS", "SSG").foreach { m =>
      val g = McosGenerator(m, spec)
      g.processFrame(0, ObjSet.of(1, 2))
      val c1 = g.intersections
      g.processFrame(1, ObjSet.of(1, 3))
      assert(g.intersections >= c1, s"$m counter must not decrease")
      assert(g.stateCount > 0)
    }
  }
}
