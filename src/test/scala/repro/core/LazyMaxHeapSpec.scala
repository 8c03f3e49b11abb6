package repro.core

import java.util.Random
import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable

class LazyMaxHeapSpec extends AnyFunSuite {

  test("peekMax on empty heap is None") {
    assert(new LazyMaxHeap[Int].peekMax.isEmpty)
  }

  test("update then peek returns the max") {
    val h = new LazyMaxHeap[String]
    h.update("a", 1.0); h.update("b", 5.0); h.update("c", 3.0)
    assert(h.peekMax.contains(("b", 5.0)))
  }

  test("updating a priority downward is observed") {
    val h = new LazyMaxHeap[String]
    h.update("a", 5.0); h.update("b", 3.0)
    h.update("a", 1.0)
    assert(h.peekMax.contains(("b", 3.0)))
  }

  test("remove drops a key") {
    val h = new LazyMaxHeap[String]
    h.update("a", 5.0); h.update("b", 3.0)
    h.remove("a")
    assert(h.peekMax.contains(("b", 3.0)))
    h.remove("b")
    assert(h.peekMax.isEmpty)
  }

  test("popMax removes and returns the max; re-update restores") {
    val h = new LazyMaxHeap[String]
    h.update("a", 5.0); h.update("b", 3.0)
    assert(h.popMax.contains(("a", 5.0)))
    assert(h.peekMax.contains(("b", 3.0)))
    h.update("a", 5.0)
    assert(h.peekMax.contains(("a", 5.0)))
  }

  for (seed <- 0 until 20)
    test(s"randomized equivalence with a reference map, seed $seed") {
      val rng = new Random(seed)
      val h   = new LazyMaxHeap[Int]
      val ref = mutable.HashMap.empty[Int, Double]
      (1 to 2000).foreach { _ =>
        rng.nextInt(4) match {
          case 0 | 1 =>
            val k = rng.nextInt(50); val p = rng.nextInt(1000) / 10.0
            h.update(k, p); ref(k) = p
          case 2 =>
            val k = rng.nextInt(50)
            h.remove(k); ref.remove(k)
          case 3 =>
            val expected = if (ref.isEmpty) None else Some(ref.values.max)
            assert(h.peekMax.map(_._2) == expected)
            h.peekMax.foreach { case (k, p) => assert(ref(k) == p) }
        }
      }
      assert(h.size == ref.size)
    }
}
