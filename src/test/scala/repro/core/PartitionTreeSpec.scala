package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tree-construction invariants (Definition 3.1) and MCF classification
  * correctness against brute-force leaf classification.
  */
class PartitionTreeSpec extends AnyFunSuite {

  private def synopsisFor(seed: Long, n: Int = 500, k: Int = 8): PassSynopsis = {
    val (cs, as) = TestSynopses.genData(n, seed)
    val sorted   = cs.sorted
    val cuts     = Array.tabulate(k - 1)(j => sorted(((j + 1).toLong * n / k).toInt))
    TestSynopses.build1D(cs, as, cuts.distinct, samplesPerLeaf = 20, seed = seed)
  }

  for (seed <- 0 until 6) {
    test(s"build1D satisfies the Definition 3.1 invariants (seed=$seed)") {
      val syn = synopsisFor(seed)
      assert(PartitionTree.invariantViolations(syn.root).isEmpty)
    }

    test(s"root statistics equal whole-dataset statistics (seed=$seed)") {
      val (cs, as) = TestSynopses.genData(500, seed)
      val syn      = synopsisFor(seed)
      assert(syn.root.count == cs.length)
      assert(math.abs(syn.root.sum - as.sum) < 1e-6 * (1 + as.sum.abs))
      assert(syn.root.min == as.min && syn.root.max == as.max)
    }
  }

  test("leaf ids are DFS-contiguous within every subtree") {
    val syn = synopsisFor(3)
    for (node <- syn.root.preorder) {
      val ids = node.leaves.map(_.leafId).toSeq
      assert(ids == (node.leafLo to node.leafHi), s"node ${node.bounds}: $ids")
    }
  }

  for (seed <- 0 until 8) {
    test(s"MCF classification matches brute-force leaf classification (seed=$seed)") {
      val syn = synopsisFor(seed + 10)
      val rnd = new scala.util.Random(seed)
      for (_ <- 0 until 25) {
        val a = rnd.nextDouble() * 110 - 5
        val b = a + rnd.nextDouble() * 60
        val q = Rect.range(a, b)
        val f = PartitionTree.mcf(syn.root, q)
        // every leaf must be accounted for exactly once
        for (l <- syn.leaves) {
          val inCover   = f.cover.exists(c => c.leafLo <= l.leafId && l.leafId <= c.leafHi)
          val inPartial = f.partial.contains(l)
          if (l.bounds.disjoint(q)) assert(!inCover && !inPartial, s"disjoint leaf ${l.bounds} returned")
          else if (q.containsRect(l.bounds)) assert(inCover && !inPartial, s"covered leaf ${l.bounds} missing")
          else if (l.count > 0) assert(inPartial && !inCover, s"partial leaf ${l.bounds} missing")
        }
        // cover nodes must be fully inside the query, partial ones leaves
        assert(f.cover.forall(c => q.containsRect(c.bounds)))
        assert(f.partial.forall(_.isLeaf))
        assert(f.visited >= 1 && f.visited <= syn.root.preorder.size)
      }
    }
  }

  test("query covering everything returns one covered node (the root)") {
    val syn = synopsisFor(1)
    val f   = PartitionTree.mcf(syn.root, Rect.range(Double.NegativeInfinity, Double.PositiveInfinity))
    assert(f.cover.map(n => n.leafHi - n.leafLo + 1).sum == syn.leaves.length)
    assert(f.partial.isEmpty)
    assert(f.visited <= 3, "MCF should stop at the root for an all-covering query")
  }

  test("query disjoint from the data returns nothing") {
    val syn = synopsisFor(2)
    val f   = PartitionTree.mcf(syn.root, Rect.range(-1000, -999))
    assert(f.cover.isEmpty && f.partial.isEmpty)
  }

  test("0-variance rule returns constant-valued nodes early for AVG") {
    // constant region [0, 50): every leaf there has min == max
    val n  = 400
    val cs = Array.tabulate(n)(i => i * 100.0 / n)
    val as = cs.map(c => if (c < 50) 7.0 else c)
    val syn = TestSynopses.build1D(cs, as, Array(12.5, 25.0, 37.5, 50.0, 75.0),
                                   samplesPerLeaf = 10, seed = 4)
    val q = Rect.range(10.0, 60.0)
    val f = PartitionTree.mcf(syn.root, q, zeroVarRule = true)
    assert(f.zeroVar.nonEmpty, "expected at least one zero-variance node")
    assert(f.zeroVar.forall(z => z.min == z.max))
    // without the rule the same nodes come back as partial/cover only
    val f2 = PartitionTree.mcf(syn.root, q, zeroVarRule = false)
    assert(f2.zeroVar.isEmpty)
  }

  test("invariantViolations flags corrupted statistics") {
    val syn = synopsisFor(5)
    syn.leaves(0).count += 1
    assert(PartitionTree.invariantViolations(syn.root).nonEmpty)
  }

  test("rollUpStats recomputes after leaf mutation") {
    val syn    = synopsisFor(6)
    val before = syn.root.sum
    syn.leaves(0).sum += 100.0
    PartitionTree.rollUpTree(syn.root)
    assert(math.abs(syn.root.sum - (before + 100.0)) < 1e-6)
  }
}
