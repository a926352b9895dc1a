package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class BucketsSpec extends AnyFunSuite {

  test("add, bucket, contains, pop") {
    val b = new Buckets(5, 10)
    b.add(3, 7)
    assert(b.contains(3) && b.bucket(3) == 7)
    assert(b.nonEmpty(7) && !b.nonEmpty(6))
    assert(b.pop(7) == 3)
    assert(!b.contains(3))
    assert(b.pop(7) == -1)
  }

  test("move relocates a vertex between cells") {
    val b = new Buckets(4, 10)
    b.add(0, 2); b.add(1, 2)
    b.move(0, 9)
    assert(b.bucket(0) == 9 && b.bucket(1) == 2)
    assert(b.pop(2) == 1 && b.pop(2) == -1)
    assert(b.pop(9) == 0)
  }

  test("move to the same bucket is a no-op") {
    val b = new Buckets(3, 5)
    b.add(2, 4)
    b.move(2, 4)
    assert(b.bucket(2) == 4)
    assert(b.pop(4) == 2)
  }

  test("remove from the middle of a list keeps the list intact") {
    val b = new Buckets(5, 3)
    (0 until 5).foreach(b.add(_, 1))
    b.remove(2)
    val popped = Iterator.continually(b.pop(1)).takeWhile(_ >= 0).toSet
    assert(popped == Set(0, 1, 3, 4))
  }

  test("double add is rejected") {
    val b = new Buckets(2, 3)
    b.add(0, 1)
    intercept[IllegalArgumentException] { b.add(0, 2) }
  }

  test("randomized stress: bucket contents always match a reference map") {
    val rnd = new Random(42)
    val n = 50; val maxB = 30
    val b = new Buckets(n, maxB)
    val ref = scala.collection.mutable.Map.empty[Int, Int]
    for (_ <- 0 until 5000) {
      val v = rnd.nextInt(n)
      rnd.nextInt(3) match {
        case 0 =>
          val cell = rnd.nextInt(maxB + 1)
          if (ref.contains(v)) { b.move(v, cell); ref(v) = cell }
          else { b.add(v, cell); ref(v) = cell }
        case 1 =>
          b.remove(v); ref.remove(v)
        case 2 =>
          assert(b.bucket(v) == ref.getOrElse(v, -1))
      }
    }
    for (cell <- 0 to maxB) {
      val popped = Iterator.continually(b.pop(cell)).takeWhile(_ >= 0).toSet
      assert(popped == ref.collect { case (v, c) if c == cell => v }.toSet, s"cell $cell")
    }
  }
}
