package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropHelper

class IndexedMinHeapSpec extends AnyFunSuite with PropHelper {

  test("popMin returns entries in key order") {
    val h = new IndexedMinHeap(10)
    h.insert(3, 30); h.insert(1, 10); h.insert(7, 20)
    assert(h.popMin() == 1)
    assert(h.popMin() == 7)
    assert(h.popMin() == 3)
    assert(h.isEmpty)
  }

  test("contains and size reflect inserts and pops") {
    val h = new IndexedMinHeap(5)
    assert(h.isEmpty && !h.nonEmpty)
    h.insert(2, 5)
    assert(h.contains(2) && h.size == 1 && h.nonEmpty)
    h.popMin()
    assert(!h.contains(2) && h.isEmpty)
  }

  test("decrease reorders the heap") {
    val h = new IndexedMinHeap(10)
    h.insert(0, 100); h.insert(1, 50); h.insert(2, 75)
    h.decrease(0, 99) // 100 -> 1
    assert(h.popMin() == 0)
  }

  test("decrease by default delta of one") {
    val h = new IndexedMinHeap(4)
    h.insert(0, 2); h.insert(1, 2)
    h.decrease(1)
    assert(h.keyOf(1) == 1)
    assert(h.popMin() == 1)
  }

  test("remove deletes an arbitrary entry and keeps order") {
    val h = new IndexedMinHeap(10)
    (0 until 6).foreach(v => h.insert(v, 10 - v))
    assert(h.remove(5)) // key 5, currently the minimum
    assert(!h.contains(5))
    assert(h.popMin() == 4)
  }

  test("remove on absent vertex returns false") {
    val h = new IndexedMinHeap(4)
    assert(!h.remove(1))
    h.insert(1, 1); h.popMin()
    assert(!h.remove(1))
  }

  test("clear empties the heap and forgets positions") {
    val h = new IndexedMinHeap(8)
    (0 until 8).foreach(v => h.insert(v, v))
    h.clear()
    assert(h.isEmpty)
    assert((0 until 8).forall(v => !h.contains(v)))
    h.insert(3, 1) // reinsertion after clear must work
    assert(h.popMin() == 3)
  }

  test("double insert of the same vertex is rejected") {
    val h = new IndexedMinHeap(4)
    h.insert(1, 1)
    intercept[IllegalArgumentException](h.insert(1, 2))
  }

  test("popMin on empty heap is rejected") {
    intercept[IllegalArgumentException](new IndexedMinHeap(4).popMin())
  }

  test("keyOf tracks decreases") {
    val h = new IndexedMinHeap(4)
    h.insert(0, 7)
    h.decrease(0, 3)
    assert(h.keyOf(0) == 4)
  }

  test("property: drain order matches a sorted reference under inserts+decreases") {
    val gen = for {
      n <- Gen.choose(1, 60)
      keys <- Gen.listOfN(n, Gen.choose(0, 1000))
      decs <- Gen.listOfN(n / 2, Gen.zip(Gen.choose(0, n - 1), Gen.choose(1, 50)))
    } yield (keys, decs)
    checkProp(Prop.forAll(gen) { case (keys, decs) =>
      val h = new IndexedMinHeap(keys.size)
      val ref = scala.collection.mutable.Map.empty[Int, Int]
      keys.zipWithIndex.foreach { case (key, v) => h.insert(v, key); ref(v) = key }
      decs.foreach { case (v, d) => if (v < keys.size) { h.decrease(v, d); ref(v) -= d } }
      val drained = Iterator.continually(if (h.nonEmpty) Some(h.popMin()) else None)
        .takeWhile(_.isDefined).flatten.toList
      val drainedKeys = drained.map(ref)
      drainedKeys == drainedKeys.sorted && drained.toSet == ref.keySet
    })
  }

  test("property: interleaved removes keep the heap consistent") {
    checkProp(Prop.forAll(Gen.listOfN(40, Gen.choose(0, 39))) { removes =>
      val h = new IndexedMinHeap(40)
      (0 until 40).foreach(v => h.insert(v, (v * 17) % 23))
      val ref = scala.collection.mutable.Map((0 until 40).map(v => v -> ((v * 17) % 23)): _*)
      removes.foreach { v => if (h.remove(v)) ref -= v }
      val drainedKeys = Iterator.continually(if (h.nonEmpty) Some(ref(h.popMin())) else None)
        .takeWhile(_.isDefined).flatten.toList
      drainedKeys == drainedKeys.sorted && drainedKeys.size == ref.size
    })
  }
}
