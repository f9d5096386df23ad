package repro.core

import repro.s2.CellId
import scala.collection.mutable.ArrayBuffer

/** Workload-statistics trie (Section 3.4, "Collecting Statistics").
  *
  * Each node keeps four hit counters — how often each of its four child
  * cells was queried — plus four child pointers, exploiting the shared
  * level-wise prefix of sibling S2 cells. The trie is pruned to start at
  * `rootCell`, the smallest cell covering the whole GeoBlock; query cells
  * outside it (answerable in O(1) by the pre-query check anyway) are
  * dropped, as are cells at or above the root level.
  */
final class StatsTrie(val rootCell: CellId) {

  final class Node {
    val hits: Array[Long] = new Array[Long](4)
    val kids: Array[Node] = new Array[Node](4)
  }

  val root  = new Node
  private var recordedCount = 0L

  def recorded: Long = recordedCount

  /** Registers one query of `cell`; returns false if the cell cannot be
    * tracked (outside the pruned root or not deeper than it). Hot path:
    * the walk extracts 2-bit child indices from the cell position
    * directly.
    */
  def record(cell: CellId): Boolean = {
    if (cell.level <= rootCell.level || !rootCell.contains(cell)) return false
    val pos  = cell.pos
    var node = root
    var s    = 2 * (cell.level - rootCell.level - 1)
    while (s > 0) {
      val idx = ((pos >>> s) & 3L).toInt
      if (node.kids(idx) == null) node.kids(idx) = new Node
      node = node.kids(idx)
      s -= 2
    }
    node.hits((pos & 3L).toInt) += 1
    recordedCount += 1
    true
  }

  /** Hit count recorded for a specific cell (0 if never seen). */
  def hitsOf(cell: CellId): Long = {
    if (cell.level <= rootCell.level || !rootCell.contains(cell)) return 0L
    val pos  = cell.pos
    var node = root
    var s    = 2 * (cell.level - rootCell.level - 1)
    while (s > 0) {
      val idx = ((pos >>> s) & 3L).toInt
      if (node.kids(idx) == null) return 0L
      node = node.kids(idx)
      s -= 2
    }
    node.hits((pos & 3L).toInt)
  }

  /** A tracked cell with its own hits and its direct parent's hits. */
  final case class Entry(cell: CellId, hits: Long, parentHits: Long) {
    /** The paper's rudimentary relevance metric. */
    def score: Long = hits + parentHits
  }

  /** All cells with at least one hit, each with its score inputs. */
  def entries: IndexedSeq[Entry] = {
    val out = ArrayBuffer.empty[Entry]
    def walk(node: Node, cell: CellId): Unit = {
      var i = 0
      while (i < 4) {
        val childCell = cell.child(i)
        if (node.hits(i) > 0)
          out += Entry(childCell, node.hits(i), hitsOf(cell))
        if (node.kids(i) != null) walk(node.kids(i), childCell)
        i += 1
      }
    }
    walk(root, rootCell)
    out.toIndexedSeq
  }

  /** Candidate cells for aggregation, in the paper's order: score
    * descending, then level ascending (coarser first), then id ascending.
    */
  def candidates: IndexedSeq[Entry] =
    entries.sortBy(e => (-e.score, e.cell.level, e.cell.id))
}

object StatsTrie {
  /** Trie pruned to the smallest cell covering the block's key range. */
  def forBlock(block: GeoBlock): StatsTrie = {
    val root =
      if (block.numCells == 0) CellId.World
      else CellId.commonAncestor(CellId(block.keys(0)), CellId(block.keys(block.numCells - 1)))
    new StatsTrie(root)
  }
}
