package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, ObjectInputStream, ObjectOutputStream}
import org.scalatest.funsuite.AnyFunSuite
import repro.core.ObjSet.ObjSet

/** The generators are Spark group state: they must survive Java
  * serialization round-trips mid-stream with all behaviour intact.
  */
class SerializationSpec extends AnyFunSuite {

  private def roundTrip[T <: AnyRef](t: T): T = {
    val bos = new ByteArrayOutputStream()
    val out = new ObjectOutputStream(bos)
    out.writeObject(t); out.close()
    new ObjectInputStream(new ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[T]
  }

  private def drive(gen: McosGenerator, fids: Range, rnd: scala.util.Random): Vector[Vector[McosResult]] =
    fids.toVector.map { fid =>
      gen.processFrame(fid, ObjSet.from((0 until 8).filter(_ => rnd.nextBoolean())))
    }

  Seq("NAIVE", "MFS", "SSG").foreach { method =>
    test(s"$method generator round-trips through Java serialization mid-stream") {
      val spec = WindowSpec(6, 3)
      val a = McosGenerator(method, spec)
      val b = McosGenerator(method, spec)
      drive(a, 0 until 20, new scala.util.Random(1))
      drive(b, 0 until 20, new scala.util.Random(1))
      val a2 = roundTrip(a)
      val cont1 = drive(a2, 20 until 40, new scala.util.Random(2))
      val cont2 = drive(b, 20 until 40, new scala.util.Random(2))
      assert(cont1.map(_.toSet) === cont2.map(_.toSet), s"$method diverged after round-trip")
    }
  }
}
