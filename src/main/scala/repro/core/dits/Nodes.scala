package repro.core.dits

import repro.core.{CellSet, MBR, Point}
import scala.collection.mutable

/** Dataset node (Def. 12): one spatial dataset summarised by its MBR in
  * cell-coordinate space, pivot, radius, and its cell-based set.
  */
final class DatasetNode(
    val id: Int,
    var rect: MBR,
    var cells: Array[Long],
) extends Serializable {
  var parent: Leaf = _
  def pivot: Point  = rect.pivot
  def radius: Double = rect.radius
  /** Cell grid coordinates decoded once for repeated connectivity probes. */
  @transient lazy val packedXY: Array[Long] = CellSet.packXY(cells)
  override def toString: String = s"DatasetNode($id, ${cells.length} cells)"
}

object DatasetNode {
  /** Build a dataset node from a cell-based dataset. */
  def apply(id: Int, cells: Array[Long]): DatasetNode = {
    val cs = CellSet.of(cells)
    new DatasetNode(id, CellSet.mbr(cs), cs)
  }
}

/** A node of the DITS-L tree: either an internal node with two children
  * (Def. 13) or a leaf holding ≤ f dataset nodes plus an inverted index
  * (Def. 14). Bidirectional parent pointers support Appendix C updates.
  */
sealed trait TreeNode extends Serializable {
  var rect: MBR
  var parent: Internal = _
  def pivot: Point   = rect.pivot
  def radius: Double = rect.radius
  def isLeaf: Boolean
  /** All dataset nodes in this subtree. */
  def datasets: Iterator[DatasetNode] = this match {
    case l: Leaf     => l.children.iterator
    case i: Internal => i.left.datasets ++ i.right.datasets
  }
  def size: Int = this match {
    case l: Leaf     => l.children.length
    case i: Internal => i.left.size + i.right.size
  }
}

final class Internal(var rect: MBR, var left: TreeNode, var right: TreeNode)
    extends TreeNode {
  def isLeaf = false
}

/** Leaf node: child dataset nodes plus the inverted index `inv` mapping
  * each cell ID to the child dataset IDs containing it (Def. 14). Posting
  * lists drive the Lemma 2/3 intersection bounds and exact verification.
  */
final class Leaf(var rect: MBR, val capacity: Int) extends TreeNode {
  def isLeaf = true
  val children: mutable.ArrayBuffer[DatasetNode] = mutable.ArrayBuffer.empty
  /** cell ID → ids (into `children` order is irrelevant; stores dataset ids). */
  val inv: mutable.HashMap[Long, mutable.ArrayBuffer[Int]] = mutable.HashMap.empty

  def add(d: DatasetNode): Unit = {
    children += d
    d.parent = this
    var i = 0
    while (i < d.cells.length) {
      inv.getOrElseUpdate(d.cells(i), mutable.ArrayBuffer.empty) += d.id
      i += 1
    }
  }

  def remove(d: DatasetNode): Unit = {
    val ix = children.indexWhere(_.id == d.id)
    require(ix >= 0, s"dataset ${d.id} not in leaf")
    children.remove(ix)
    var i = 0
    while (i < d.cells.length) {
      val c = d.cells(i)
      inv.get(c).foreach { pl =>
        val j = pl.indexOf(d.id)
        if (j >= 0) pl.remove(j)
        if (pl.isEmpty) inv.remove(c)
      }
      i += 1
    }
  }
}
