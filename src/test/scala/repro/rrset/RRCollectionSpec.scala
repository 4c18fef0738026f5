package repro.rrset

import org.scalatest.funsuite.AnyFunSuite

class RRCollectionSpec extends AnyFunSuite {

  private def mk(n: Int, cpe: Array[Double], sets: Seq[(Int, Seq[Int])]): RRCollection = {
    val c = new RRCollection(n, cpe)
    sets.foreach { case (tag, ms) => c.add(tag, ms.toArray, ms.size) }
    c.rebuildIndex()
    c
  }

  test("stores sets, tags and sizes") {
    val c = mk(5, Array(1.0, 2.0), Seq((0, Seq(0, 1)), (1, Seq(2)), (0, Seq(3, 4, 0))))
    assert(c.numSets == 3 && c.totalNodes == 6)
    assert(c.tagOf(0) == 0 && c.tagOf(1) == 1 && c.tagOf(2) == 0)
    assert(c.setMembers(2).toSeq == Seq(3, 4, 0))
  }

  test("gamma and scalePerSet") {
    val c = mk(10, Array(1.0, 3.0), Seq((0, Seq(1)), (1, Seq(2))))
    assert(c.gamma == 4.0)
    assert(c.scalePerSet == 10.0 * 4.0 / 2)
  }

  test("piOf counts only sets with the matching tag") {
    val c = mk(4, Array(1.0, 1.0), Seq((0, Seq(0)), (1, Seq(0)), (0, Seq(1))))
    val scale = c.scalePerSet
    assert(c.piOf(0, Seq(0)) == scale)       // only the tag-0 set {0}
    assert(c.piOf(1, Seq(0)) == scale)       // only the tag-1 set {0}
    assert(c.piOf(0, Seq(0, 1)) == 2 * scale)
    assert(c.piOf(1, Seq(1)) == 0.0)
  }

  test("piOf counts each covered set once (union semantics)") {
    val c = mk(4, Array(1.0), Seq((0, Seq(0, 1, 2))))
    assert(c.piOf(0, Seq(0, 1, 2)) == c.scalePerSet)
  }

  test("singletonCount and sigmaSingleton") {
    val c = mk(4, Array(2.0), Seq((0, Seq(0)), (0, Seq(0, 1)), (0, Seq(2))))
    assert(c.singletonCount(0, 0) == 2)
    assert(c.singletonCount(1, 0) == 1)
    assert(c.singletonCount(3, 0) == 0)
    // σ̂(0) = scale·cnt/cpe = (4·2/3)·2/2
    assert(math.abs(c.sigmaSingleton(0, 0) - (4.0 * 2 / 3) * 2 / 2.0) < 1e-12)
  }

  test("session gain equals uncovered count times scale") {
    val c = mk(4, Array(1.0), Seq((0, Seq(0, 1)), (0, Seq(1)), (0, Seq(2))))
    val s = c.newSession()
    assert(s.gain(1, 0) == 2 * c.scalePerSet)
    s.add(0, 0) // covers set 0
    assert(s.gain(1, 0) == 1 * c.scalePerSet) // set 0 now covered
    assert(s.pi(0) == c.scalePerSet)
    s.add(1, 0)
    assert(s.pi(0) == 2 * c.scalePerSet)
    assert(s.gain(2, 0) == c.scalePerSet)
  }

  test("session matches from-scratch piOf on random adds") {
    val rng = new java.util.SplittableRandom(5)
    val sets = Seq.fill(50)((rng.nextInt(2), Seq.fill(1 + rng.nextInt(4))(rng.nextInt(8))))
    val c = mk(8, Array(1.5, 0.5), sets)
    val s = c.newSession()
    val chosen = Array.fill(2)(List.empty[Int])
    for (_ <- 0 until 10) {
      val i = rng.nextInt(2); val u = rng.nextInt(8)
      s.add(u, i)
      chosen(i) ::= u
      assert(math.abs(s.pi(i) - c.piOf(i, chosen(i))) < 1e-9)
    }
  }

  test("session gain is non-increasing (lazy-heap precondition)") {
    val rng = new java.util.SplittableRandom(9)
    val sets = Seq.fill(80)((0, Seq.fill(1 + rng.nextInt(5))(rng.nextInt(10))))
    val c = mk(10, Array(1.0), sets)
    val s = c.newSession()
    val before = Array.tabulate(10)(u => s.gain(u, 0))
    s.add(rng.nextInt(10), 0)
    val after = Array.tabulate(10)(u => s.gain(u, 0))
    assert((0 until 10).forall(u => after(u) <= before(u) + 1e-12))
  }

  test("addPacked equals repeated add") {
    val c1 = new RRCollection(4, Array(1.0))
    c1.addPacked(Array[Byte](0, 0), Array(2, 1), Array(0, 1, 2))
    c1.rebuildIndex()
    val c2 = mk(4, Array(1.0), Seq((0, Seq(0, 1)), (0, Seq(2))))
    assert(c1.numSets == c2.numSets)
    assert(c1.setMembers(0).toSeq == c2.setMembers(0).toSeq)
    assert(c1.piOf(0, Seq(0)) == c2.piOf(0, Seq(0)))
  }

  test("growth past initial capacity keeps contents") {
    val c = new RRCollection(3, Array(1.0))
    for (k <- 0 until 5000) c.add(0, Array(k % 3), 1)
    c.rebuildIndex()
    assert(c.numSets == 5000)
    assert(c.singletonCount(0, 0) + c.singletonCount(1, 0) + c.singletonCount(2, 0) == 5000)
  }

  test("appending after index rebuild invalidates and rebuilds correctly") {
    val c = mk(3, Array(1.0), Seq((0, Seq(0))))
    assert(c.singletonCount(0, 0) == 1)
    c.add(0, Array(0), 1)
    c.rebuildIndex()
    assert(c.singletonCount(0, 0) == 2)
    assert(c.scalePerSet == 3.0 / 2)
  }

  test("empty seed set has zero estimated revenue") {
    val c = mk(3, Array(1.0), Seq((0, Seq(0)), (0, Seq(1))))
    assert(c.piOf(0, Seq.empty) == 0.0)
  }

  test("piOf ignores nodes outside any set") {
    val c = mk(5, Array(1.0), Seq((0, Seq(0, 1))))
    assert(c.piOf(0, Seq(4)) == 0.0)
  }
}
