package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.WindowSpec

/** Figure 5 — MCOS generation time vs duration threshold d ∈ [180, 270] at
  * w = 300. Expected shape: essentially flat in d (d only gates the Result
  * State Set; all states are maintained regardless), MFS/SSG under NAIVE
  * (paper: MFS up to >3x on V2, SSG up to ~3.5x on M2).
  */
class Fig5DurationBench extends AnyFunSuite {
  private val methods = Seq("NAIVE", "MFS", "SSG")
  private val durations = Seq(180, 210, 240, 270)

  test("Figure 5: varying duration d") {
    BenchHarness.warmUp()
    val times = scala.collection.mutable.Map.empty[(String, String), Vector[Double]]
    val rows = for {
      name <- BenchHarness.datasets
      d <- durations
    } yield {
      val s = BenchHarness.stream(name)
      val cells = methods.map(m => BenchHarness.runMcos(s, WindowSpec(300, d), m))
      methods.zip(cells).foreach { case (m, c) =>
        times((name, m)) = times.getOrElse((name, m), Vector.empty) :+ c.ms
      }
      Seq(name, d.toString) ++ cells.map(c => BenchHarness.ms(c.ms)) ++
        Seq(BenchHarness.speedup(cells(0).ms, cells(1).ms),
            BenchHarness.speedup(cells(0).ms, cells(2).ms))
    }
    BenchHarness.printTable(
      "Figure 5: time (ms) vs duration d  [w=300]",
      Seq("Dataset", "d", "NAIVE", "MFS", "SSG", "NAIVE/MFS", "NAIVE/SSG"),
      rows,
      note = "Paper shape: flat in d; MFS/SSG consistently under NAIVE.")

    // Flatness: per dataset×method, max/min across d stays within 2x.
    times.foreach { case ((name, m), ts) =>
      assert(ts.max / ts.min < 2.0, s"$name/$m: time should be stable in d, got $ts")
    }
    // MFS/SSG under NAIVE at the default d for every dataset.
    BenchHarness.datasets.foreach { name =>
      val n = times((name, "NAIVE")).sum
      assert(times((name, "MFS")).sum < n, s"$name: MFS total must beat NAIVE")
      assert(times((name, "SSG")).sum < n * 1.05, s"$name: SSG must not lose to NAIVE")
    }
  }
}
