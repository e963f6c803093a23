package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.WindowSpec

/** Diagnostic (not part of the reproduction tables): state-space and
  * intersection-count profile per method.
  */
class ProbeBench extends AnyFunSuite {
  test("probe counters") {
    val spec = WindowSpec(300, 240)
    for (name <- Seq("V1", "D2", "M1", "M2")) {
      val s = BenchHarness.stream(name)
      for (m <- Seq("NAIVE", "MFS", "SSG")) {
        val r = BenchHarness.runMcos(s, spec, m)
        println(f"$name%-3s $m%-6s ms=${r.ms}%9.1f endStates=${r.states}%6d inters=${r.intersections}%10d results=${r.results}%8d")
      }
    }
  }
}
