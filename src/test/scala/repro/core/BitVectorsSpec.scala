package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite

import repro.PropSupport

/** Bit-vector substrate tests: construction, boolean algebra, compaction,
  * and the sidecar wire format.
  */
class BitVectorsSpec extends AnyFunSuite with PropSupport {

  test("empty has no set bits") {
    val v = BitVec.empty(100)
    assert(v.cardinality === 0)
    assert((0 until 100).forall(i => !v.get(i)))
  }

  test("full has all bits set, including non-word-aligned lengths") {
    for (n <- Seq(1, 63, 64, 65, 127, 128, 1000)) {
      val v = BitVec.full(n)
      assert(v.cardinality === n, s"n=$n")
      assert((0 until n).forall(v.get), s"n=$n")
    }
  }

  test("fromBooleans round-trips") {
    val bs = Vector(true, false, true, true, false)
    assert(BitVec.fromBooleans(bs).toBooleans === bs)
  }

  test("get out of range throws") {
    intercept[IllegalArgumentException](BitVec.empty(5).get(5))
    intercept[IllegalArgumentException](BitVec.empty(5).get(-1))
  }

  test("and/or length mismatch throws") {
    intercept[IllegalArgumentException](BitVec.empty(5).and(BitVec.empty(6)))
    intercept[IllegalArgumentException](BitVec.empty(5).or(BitVec.empty(6)))
  }

  test("setBits lists indices ascending") {
    val v = BitVec.fromBooleans(Vector(false, true, false, true, true))
    assert(v.setBits === Vector(1, 3, 4))
  }

  test("compact keeps only requested positions") {
    val v = BitVec.fromBooleans(Vector(true, false, true, false, true))
    assert(v.compact(Vector(0, 1, 4)).toBooleans === Vector(true, false, true))
  }

  test("intersectAll of nothing is full (identity)") {
    assert(BitVec.intersectAll(10, Seq.empty).cardinality === 10)
  }

  test("unionAll of nothing is empty (identity)") {
    assert(BitVec.unionAll(10, Seq.empty).cardinality === 0)
  }

  test("equals and hashCode respect content") {
    val a = BitVec.fromBooleans(Vector(true, false, true))
    val b = BitVec.fromBooleans(Vector(true, false, true))
    val c = BitVec.fromBooleans(Vector(true, true, true))
    assert(a === b); assert(a.hashCode === b.hashCode); assert(a !== c)
  }

  private val boolsGen: Gen[List[Boolean]] =
    Gen.choose(0, 300).flatMap(n => Gen.listOfN(n, Gen.oneOf(true, false)))

  test("property: and/or agree with element-wise boolean ops") {
    forAllSamples(Gen.zip(boolsGen, boolsGen)) { case (xs0, ys0) =>
      val n  = math.min(xs0.size, ys0.size)
      val xs = xs0.take(n); val ys = ys0.take(n)
      val a  = BitVec.fromBooleans(xs); val b = BitVec.fromBooleans(ys)
      assert(a.and(b).toBooleans === xs.zip(ys).map(t => t._1 && t._2))
      assert(a.or(b).toBooleans === xs.zip(ys).map(t => t._1 || t._2))
    }
  }

  test("property: cardinality equals count of true") {
    forAllSamples(boolsGen) { bs =>
      assert(BitVec.fromBooleans(bs).cardinality === bs.count(identity))
    }
  }

  private def roundTrip(m: Map[Int, BitVec]): Map[Int, BitVec] = {
    val bos = new ByteArrayOutputStream()
    BitVectors.write(new DataOutputStream(bos), m)
    BitVectors.read(new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
  }

  test("sidecar serialization round-trips") {
    val m = Map(
      1 -> BitVec.fromBooleans(Vector.tabulate(130)(_ % 3 == 0)),
      7 -> BitVec.full(64),
      9 -> BitVec.empty(1),
    )
    assert(roundTrip(m) === m)
  }

  test("sidecar serialization round-trips the empty map") {
    assert(roundTrip(Map.empty) === Map.empty)
  }

  test("property: sidecar round-trips arbitrary maps") {
    val entryGen = Gen.zip(Gen.choose(0, 50), boolsGen.map(BitVec.fromBooleans))
    forAllSamples(Gen.listOf(entryGen).map(_.toMap), n = 50) { m =>
      assert(roundTrip(m) === m)
    }
  }

  test("bad magic is rejected") {
    val bytes = Array.fill[Byte](8)(0x11)
    intercept[IllegalArgumentException](
      BitVectors.read(new DataInputStream(new ByteArrayInputStream(bytes))))
  }
}
