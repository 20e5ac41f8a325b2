package repro.core.dits

import repro.core.{CellSet, MBR}
import scala.collection.mutable

/** OJSP result entry: dataset id and its exact `|S_Q ∩ S_D|`. */
final case class OverlapHit(id: Int, overlap: Int)

/** Algorithm 2 — OverlapSearch: branch-and-bound over DITS-L with
  * leaf-level intersection bounds (Lemmas 2–3), followed by exact
  * verification through the leaf inverted indexes.
  *
  * Filter step: internal nodes whose MBR misses the query MBR are pruned
  * outright (their intersection is 0). Each surviving leaf gets an upper
  * bound (number of query cells present in its inverted-index key set) and
  * a lower bound (query cells whose posting list covers every child).
  * Leaves whose upper bound cannot beat the current k-th best are pruned
  * in batch.
  *
  * Verification step: leaves are processed in descending upper-bound order
  * so the top-k heap tightens as early as possible; per-dataset counts come
  * from one pass over the query cells' posting lists.
  */
object OverlapSearch {

  /** Lemma 2: upper bound of `|S_Q ∩ S_D|` over all datasets in `leaf`. */
  def upperBound(leaf: Leaf, query: Array[Long]): Int = {
    var n = 0; var i = 0
    while (i < query.length) { if (leaf.inv.contains(query(i))) n += 1; i += 1 }
    n
  }

  /** Lemma 3: lower bound — query cells contained by *every* child of the
    * leaf, so every child dataset has at least this overlap.
    */
  def lowerBound(leaf: Leaf, query: Array[Long]): Int = {
    val full = leaf.children.length
    if (full == 0) return 0
    var n = 0; var i = 0
    while (i < query.length) {
      leaf.inv.get(query(i)) match {
        case Some(pl) if pl.length == full => n += 1
        case _                             =>
      }
      i += 1
    }
    n
  }

  /** Exact per-dataset overlap for one leaf via its posting lists. */
  def verifyLeaf(leaf: Leaf, query: Array[Long]): mutable.HashMap[Int, Int] = {
    val counts = mutable.HashMap.empty[Int, Int]
    var i = 0
    while (i < query.length) {
      leaf.inv.get(query(i)) match {
        case Some(pl) =>
          var j = 0
          while (j < pl.length) { counts.update(pl(j), counts.getOrElse(pl(j), 0) + 1); j += 1 }
        case None =>
      }
      i += 1
    }
    counts
  }

  /** Top-k datasets by exact overlap with `query` (sorted cell IDs).
    * Datasets with overlap 0 are never returned (their MBRs are pruned).
    * Ties are broken by smaller dataset id for determinism.
    */
  def search(index: DitsLocal, queryCells: Array[Long], k: Int): Seq[OverlapHit] = {
    require(k > 0, "k must be positive")
    if (queryCells.isEmpty) return Seq.empty
    val qRect = CellSet.mbr(queryCells)

    // ---- Filter: collect candidate leaves with bounds (BranchAndBound). --
    val cands = mutable.ArrayBuffer.empty[(Leaf, Int, Int)] // (leaf, lb, ub)
    var bestLb = 0
    def descend(n: TreeNode): Unit = n match {
      case l: Leaf =>
        if (l.rect.intersects(qRect)) {
          val ub = upperBound(l, queryCells)
          if (ub > 0) {
            val lb = lowerBound(l, queryCells)
            if (lb > bestLb) bestLb = lb
            cands += ((l, lb, ub))
          }
        }
      case i: Internal =>
        if (i.rect.intersects(qRect)) { descend(i.left); descend(i.right) }
    }
    descend(index.root)

    // ---- Verification in descending-ub order with a top-k min-heap. -----
    // Heap orders by (overlap asc, id desc) so peek() is the weakest kept
    // hit and ties prefer smaller ids.
    implicit val ord: Ordering[OverlapHit] =
      Ordering.by[OverlapHit, (Int, Int)](h => (-h.overlap, h.id))
    val heap = mutable.PriorityQueue.empty[OverlapHit] // head = weakest
    def kth: Int = if (heap.size < k) 0 else heap.head.overlap

    for ((leaf, _, ub) <- cands.sortBy(-_._3)) {
      if (!(heap.size >= k && ub < kth)) { // batch prune (Alg. 2 line 19)
        val counts = verifyLeaf(leaf, queryCells)
        counts.foreach { case (id, ov) =>
          if (heap.size < k) heap.enqueue(OverlapHit(id, ov))
          else if (ov > heap.head.overlap ||
                   (ov == heap.head.overlap && id < heap.head.id)) {
            heap.dequeue(); heap.enqueue(OverlapHit(id, ov))
          }
        }
      }
    }
    heap.dequeueAll.reverse.toSeq
  }
}
