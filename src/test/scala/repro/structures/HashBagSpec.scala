package repro.structures

import org.scalatest.funsuite.AnyFunSuite

class HashBagSpec extends AnyFunSuite {

  test("insert then extractAll returns the inserted set") {
    val bag = new HashBag(100)
    (0 until 50).foreach(i => assert(bag.insert(i * 3)))
    assert(bag.extractAll().sorted.toSeq == (0 until 50).map(_ * 3))
  }

  test("duplicate insert is a no-op") {
    val bag = new HashBag(10)
    assert(bag.insert(7))
    assert(!bag.insert(7))
    assert(bag.size == 1)
    assert(bag.extractAll().toSeq == Seq(7))
  }

  test("extractAll resets the bag") {
    val bag = new HashBag(10)
    bag.insert(1); bag.insert(2)
    bag.extractAll()
    assert(bag.size == 0)
    assert(bag.extractAll().isEmpty)
  }

  test("bag is reusable after extractAll") {
    val bag = new HashBag(10)
    bag.insert(1)
    bag.extractAll()
    bag.insert(2); bag.insert(3)
    assert(bag.extractAll().sorted.toSeq == Seq(2, 3))
  }

  test("grows past the first chunk (λ = 256)") {
    val bag = new HashBag(16)
    val n = 5000
    (0 until n).foreach(i => bag.insert(i))
    assert(bag.size == n)
    assert(bag.extractAll().sorted.toSeq == (0 until n))
  }

  test("used prefix stays small for small content") {
    val bag = new HashBag(100000)
    (0 until 10).foreach(bag.insert)
    assert(bag.usedPrefix <= HashBag.Lambda * 4)
  }

  test("copy is independent") {
    val bag = new HashBag(10)
    bag.insert(1)
    val c = bag.copy()
    c.insert(2)
    assert(bag.size == 1 && c.size == 2)
    assert(bag.extractAll().toSeq == Seq(1))
    assert(c.extractAll().sorted.toSeq == Seq(1, 2))
  }

  test("large random workload with duplicates") {
    val rng = new java.util.Random(1)
    val bag = new HashBag(1000)
    val ref = scala.collection.mutable.Set[Int]()
    (0 until 20000).foreach { _ =>
      val v = rng.nextInt(3000)
      assert(bag.insert(v) == ref.add(v))
    }
    assert(bag.extractAll().sorted.toSeq == ref.toSeq.sorted)
  }

  test("rejects negative values") {
    val bag = new HashBag(10)
    intercept[IllegalArgumentException](bag.insert(-1))
  }

  test("size tracks inserts across chunks") {
    val bag = new HashBag(8)
    (0 until 1000).foreach(i => bag.insert(i * 2))
    assert(bag.size == 1000)
  }
}
