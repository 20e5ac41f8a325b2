package repro.core.dits

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{CellSet, Grid}
import scala.util.Random

/** Lemma 2/3 (leaf intersection bounds) and Lemma 4 (node distance
  * bounds): the exact value always lies within [lb, ub].
  */
class BoundsSpec extends AnyFunSuite {

  private def randomCells(rnd: Random, n: Int, span: Int = 48): Array[Long] = {
    val cx = rnd.nextInt(span); val cy = rnd.nextInt(span)
    CellSet.of(Array.fill(n) {
      val x = math.min(span - 1, math.max(0, cx + rnd.nextInt(9) - 4))
      val y = math.min(span - 1, math.max(0, cy + rnd.nextInt(9) - 4))
      Grid.interleave(x, y)
    })
  }

  for (seed <- 0 until 15) {
    test(s"Lemmas 2–3: leaf lb ≤ exact per-dataset overlap ≤ leaf ub (seed=$seed)") {
      val rnd = new Random(seed)
      val ds = (0 until 30).map(id => id -> randomCells(rnd, 1 + rnd.nextInt(25)))
      val ix = DitsLocal.build(ds, 5)
      val query = randomCells(rnd, 1 + rnd.nextInt(30))
      DitsLocal.leaves(ix.root).foreach { leaf =>
        val ub = OverlapSearch.upperBound(leaf, query)
        val lb = OverlapSearch.lowerBound(leaf, query)
        assert(lb <= ub)
        leaf.children.foreach { d =>
          val exact = CellSet.intersectionSize(d.cells, query)
          assert(exact <= ub, s"exact=$exact > ub=$ub for dataset ${d.id}")
          assert(exact >= lb, s"exact=$exact < lb=$lb for dataset ${d.id}")
        }
      }
    }
  }

  test("upper bound is tight when the leaf holds a superset dataset") {
    val q = CellSet.of(Seq(Grid.interleave(1, 1), Grid.interleave(2, 2)))
    val ix = DitsLocal.build(Seq(0 -> q), 4)
    val leaf = DitsLocal.leaves(ix.root).head
    assert(OverlapSearch.upperBound(leaf, q) == 2)
    assert(OverlapSearch.lowerBound(leaf, q) == 2) // single child ⇒ lb = ub
  }

  for (seed <- 0 until 15) {
    test(s"Lemma 4: node-distance bounds contain the exact dataset distance (seed=$seed)") {
      val rnd = new Random(500 + seed)
      val a = randomCells(rnd, 1 + rnd.nextInt(20))
      val b = randomCells(rnd, 1 + rnd.nextInt(20))
      val na = DatasetNode(0, a); val nb = DatasetNode(1, b)
      val (lb, ub) = CoverageSearch.distBounds(na.pivot, na.radius, nb.pivot, nb.radius)
      val exact = CellSet.minDist(a, b)
      assert(lb <= exact + 1e-9, s"lb=$lb > exact=$exact")
      assert(ub >= exact - 1e-9, s"ub=$ub < exact=$exact")
    }
  }

  test("Example 6 shape: bounds bracket the exact distance for two clusters") {
    // Two 2-cell diagonal clusters 5 apart (mirrors the paper's Example 6).
    val sq = CellSet.of(Seq(Grid.interleave(0, 0), Grid.interleave(1, 1)))
    val sd = CellSet.of(Seq(Grid.interleave(5, 0), Grid.interleave(6, 1)))
    val nq = DatasetNode(0, sq); val nd = DatasetNode(1, sd)
    val (lb, ub) = CoverageSearch.distBounds(nq.pivot, nq.radius, nd.pivot, nd.radius)
    val exact = CellSet.minDist(sq, sd) // (1,1) to (5,0): sqrt(17)
    assert(math.abs(exact - math.sqrt(17)) < 1e-9)
    assert(lb <= exact && exact <= ub)
  }
}
