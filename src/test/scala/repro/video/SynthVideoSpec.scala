package repro.video

import org.scalatest.funsuite.AnyFunSuite

/** The synthetic detection/tracking substitute must be deterministic and must
  * land near the published Table 6 statistics it is calibrated against —
  * those statistics are what drive MCOS-generation cost.
  */
class SynthVideoSpec extends AnyFunSuite {

  test("generation is deterministic in the profile seed") {
    val a = SynthVideo.generate(Profiles.D1)
    val b = SynthVideo.generate(Profiles.D1)
    assert(a === b)
  }

  test("streams are fid-dense and ids are unique within a frame") {
    Profiles.all.foreach { p =>
      val s = SynthVideo.generate(p)
      assert(s.frames.size === p.frames)
      s.frames.foreach { objs =>
        val ids = objs.map(_._1)
        assert(ids.distinct.size === ids.size, s"${p.name}: duplicate id in frame")
        assert(ids === ids.sorted)
      }
    }
  }

  test("an object keeps one class for its whole track") {
    Profiles.all.foreach { p =>
      val byId = SynthVideo.generate(p).rows.groupBy(_.oid)
      byId.foreach { case (oid, rows) =>
        assert(rows.map(_.cls).distinct.size === 1, s"${p.name}: object $oid changes class")
      }
    }
  }

  test("every profile reproduces its Table 6 statistics within tolerance") {
    Profiles.all.foreach { p =>
      val got = SynthVideo.generate(p).stats
      val want = Profiles.paperTable6(p.name)
      def close(g: Double, w: Double, tol: Double): Unit =
        assert(math.abs(g - w) / w <= tol,
          f"${p.name}: got $g%.2f want $w%.2f (±${tol * 100}%.0f%%) — stats: $got")
      assert(got.frames === want.frames)
      close(got.objects.toDouble, want.objects.toDouble, 0.05)
      close(got.objPerFrame, want.objPerFrame, 0.25)
      close(got.framesPerObj, want.framesPerObj, 0.25)
      close(got.occPerObj, want.occPerObj, 0.35)
    }
  }

  test("id reuse (p_o) reduces distinct ids and raises occlusions per id") {
    val base = SynthVideo.generate(Profiles.M1).stats
    val reused = SynthVideo.generate(Profiles.M1, idReuse = 3).stats
    assert(reused.objects < base.objects)
    assert(reused.occPerObj > base.occPerObj)
  }

  test("id reuse never lets two live tracks share an id") {
    (1 to 3).foreach { po =>
      val s = SynthVideo.generate(Profiles.M2, idReuse = po)
      s.frames.foreach { objs =>
        val ids = objs.map(_._1)
        assert(ids.distinct.size === ids.size, s"p_o=$po: id collision within a frame")
      }
    }
  }

  test("rows are a faithful flat view of the per-frame sets") {
    val s = SynthVideo.generate(Profiles.V2)
    val regrouped = s.rows.groupBy(_.fid).view
      .mapValues(_.map(r => (r.oid, r.cls)).sortBy(_._1).toVector).toMap
    s.frames.zipWithIndex.foreach { case (objs, fid) =>
      assert(regrouped.getOrElse(fid, Vector.empty) === objs)
    }
    assert(s.rows.forall(_.vid == "V2"))
  }
}
