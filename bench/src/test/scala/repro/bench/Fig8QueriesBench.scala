package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.WindowSpec
import repro.query.CnfQuery

/** Figure 8 — MCOS generation + query evaluation time vs number of CNF
  * queries (10..50), w=300, d=240. Expected shape: flat in #queries (the
  * inverted-index evaluation is negligible next to state maintenance);
  * MFS/SSG >2x under NAIVE (paper Fig 8a), SSG ahead of MFS on the
  * denser feed (paper Fig 8b, overall speedup >3x).
  */
class Fig8QueriesBench extends AnyFunSuite {
  private val spec = WindowSpec(300, 240)
  private val methods = Seq("NAIVE", "MFS", "SSG")
  private val counts = Seq(10, 20, 30, 40, 50)
  // The paper plots two datasets; one static-camera, one moving-camera.
  private val datasets = Seq("D2", "M2")

  test("Figure 8: varying the number of queries") {
    BenchHarness.warmUp()
    val times = scala.collection.mutable.Map.empty[(String, String), Vector[Double]]
    val rows = for {
      name <- datasets
      n <- counts
    } yield {
      val s = BenchHarness.stream(name)
      val queries = CnfQuery.randomQueries(n, seed = 1234 + n)
      val cells = methods.map(m =>
        BenchHarness.runPipeline(s, spec, m, queries, pruneByEval = false))
      methods.zip(cells).foreach { case (m, c) =>
        times((name, m)) = times.getOrElse((name, m), Vector.empty) :+ c.ms
      }
      Seq(name, n.toString) ++ cells.map(c => BenchHarness.ms(c.ms)) ++
        Seq(BenchHarness.speedup(cells(0).ms, cells(1).ms),
            BenchHarness.speedup(cells(0).ms, cells(2).ms))
    }
    BenchHarness.printTable(
      "Figure 8: gen+eval time (ms) vs #queries  [w=300, d=240]",
      Seq("Dataset", "#Q", "NAIVE_E", "MFS_E", "SSG_E", "NAIVE/MFS", "NAIVE/SSG"),
      rows,
      note = "Paper shape: flat in #queries — query evaluation cost is negligible " +
             "next to state maintenance.")

    times.foreach { case ((name, m), ts) =>
      assert(ts.max / ts.min < 2.0, s"$name/$m: time should be flat in #queries: $ts")
    }
    datasets.foreach { name =>
      assert(times((name, "MFS")).sum < times((name, "NAIVE")).sum,
        s"$name: MFS must beat NAIVE")
      assert(times((name, "SSG")).sum < times((name, "NAIVE")).sum * 1.05,
        s"$name: SSG must not lose to NAIVE")
    }
  }
}
