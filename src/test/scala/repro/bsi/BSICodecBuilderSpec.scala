package repro.bsi

import org.scalatest.funsuite.AnyFunSuite

/** Serialization round-trips and builder semantics. */
class BSICodecBuilderSpec extends AnyFunSuite {
  import RefModel._

  test("codec round-trips the empty BSI") {
    assert(BSICodec.deserialize(BSICodec.serialize(BSI.empty)) == BSI.empty)
  }

  test("codec decodes null and zero-length input to empty") {
    assert(BSICodec.deserialize(null) == BSI.empty)
    assert(BSICodec.deserialize(Array.empty[Byte]) == BSI.empty)
  }

  for (seed <- 0 until 5) {
    test(s"codec round-trips random BSIs (seed $seed)") {
      val r = random(seed * 17, 300 + seed * 100, 10000, 1L << (8 + seed * 8))
      val b = toBsi(r)
      val back = BSICodec.deserialize(BSICodec.serialize(b))
      assert(back == b)
      assert(bsiToRef(back) == r)
    }
  }

  test("codec round-trips a binary bitmap") {
    val bm = org.roaringbitmap.RoaringBitmap.bitmapOf(0, 3, 7, 100000)
    val back = BSICodec.deserialize(BSICodec.serializeBitmap(bm))
    assert(bitmapToSet(back.existence) == Set(0, 3, 7, 100000))
    assert(back.numSlices == 1)
  }

  test("java serialization round-trips a BSI (aggregation buffers)") {
    val b = toBsi(random(3, 500, 5000, 1L << 16))
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(b)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[BSI]
    assert(back == b)
    assert(back.count == b.count) // existence cache rebuilds after deserialization
  }

  test("builder put assigns, addTo accumulates") {
    val b = new BSIBuilder
    b.put(1, 5L).put(2, 7L)
    b.addTo(1, 3L)   // 5 + 3
    b.addTo(3, 11L)  // fresh position via addTo
    val r = b.result()
    assert(bsiToRef(r) == Map(1 -> 8L, 2 -> 7L, 3 -> 11L))
  }

  test("builder addTo with zero is a no-op") {
    val b = new BSIBuilder
    b.put(1, 5L).addTo(1, 0L).addTo(9, 0L)
    assert(bsiToRef(b.result()) == Map(1 -> 5L))
  }

  test("builder merge sums colliding positions, unions disjoint ones") {
    val a = new BSIBuilder
    a.put(1, 5L).put(2, 6L)
    val b = new BSIBuilder
    b.put(2, 10L).put(3, 1L)
    a.merge(b)
    assert(bsiToRef(a.result()) == Map(1 -> 5L, 2 -> 16L, 3 -> 1L))
  }

  test("builder merge with disjoint positions equals fromPairs of the union") {
    val r1 = random(71, 300, 2000, 1000L).view.filterKeys(_ % 2 == 0).toMap
    val r2 = random(72, 300, 2000, 1000L).view.filterKeys(_ % 2 == 1).toMap
    val a = new BSIBuilder
    r1.foreach { case (p, v) => a.put(p, v) }
    val b = new BSIBuilder
    r2.foreach { case (p, v) => b.put(p, v) }
    assert(bsiToRef(a.merge(b).result()) == r1 ++ r2)
  }

  test("builder java-serializes (Spark shuffle path)") {
    val b = new BSIBuilder
    b.put(5, 123L).put(9, 7L)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(b)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[BSIBuilder]
    back.addTo(5, 1L)
    assert(bsiToRef(back.result()) == Map(5 -> 124L, 9 -> 7L))
  }

  test("serialized size tracks compression: dense small values beat sparse big ones") {
    val dense  = toBsi((0 until 4096).map(p => p -> 1L).toMap)
    val sparse = toBsi((0 until 4096).map(p => p * 1000 -> (1L << 30 | p.toLong)).toMap)
    assert(BSICodec.serialize(dense).length < BSICodec.serialize(sparse).length)
  }
}
