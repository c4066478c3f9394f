package repro.baseline

import scala.collection.mutable
import repro.core.Event

/** PS-growth (Kiran et al. 2019): recursive pattern growth over the
  * PS-tree, producing all *recurring itemsets* — itemsets whose total
  * occurrence count reaches `minCount` — together with their periodic
  * summaries. Bottom-up header traversal with summary push-up, conditional
  * PS-trees per extension, exactly in the PF/PS-growth family style.
  */
object PSGrowth {

  /** A recurring itemset and the (lossy) periodic summaries describing its
    * temporal distribution.
    */
  final case class Recurring(itemset: Vector[Event], summaries: Vector[Summary]) {
    def totalCount: Int = Summary.totalCount(summaries)
  }

  /** Counters for the baseline-vs-STPM comparison benches. */
  final class Stats {
    var treeNodesBuilt: Long = 0L
    var condTreesBuilt: Long = 0L
    var itemsetsEmitted: Long = 0L
  }

  /** Mine all recurring itemsets of size <= maxSize from granule
    * transactions `(ts, items)`.
    */
  def mine(transactions: Seq[(Int, Set[Event])], maxPer: Int, minCount: Int,
           maxSize: Int, stats: Stats = new Stats): Vector[Recurring] = {
    require(minCount >= 1 && maxSize >= 1)
    val tree = PSTree.build(transactions, maxPer, minCount)
    stats.treeNodesBuilt += tree.nodeCount
    val out = Vector.newBuilder[Recurring]
    growth(tree, Nil, minCount, maxSize, out, stats)
    out.result()
  }

  private def growth(tree: PSTree, suffix: List[Event], minCount: Int, maxSize: Int,
                     out: mutable.Builder[Recurring, Vector[Recurring]],
                     stats: Stats): Unit = {
    for (item <- tree.itemsBottomUp) {
      val nodes = tree.nodesOf(item)
      if (nodes.nonEmpty) {
        val summ = nodes.map(_.summaries)
          .foldLeft(Vector.empty[Summary])(Summary.merge(_, _, tree.maxPer))
        if (Summary.totalCount(summ) >= minCount) {
          val itemset = (item :: suffix).toVector.sorted
          out += Recurring(itemset, summ)
          stats.itemsetsEmitted += 1
          if (itemset.size < maxSize) {
            val cond = new PSTree(tree.maxPer, tree.rank)
            for (n <- nodes) {
              val path = ancestors(n)
              if (path.nonEmpty) cond.insertWith(path, n.summaries)
            }
            stats.condTreesBuilt += 1
            stats.treeNodesBuilt += cond.nodeCount
            growth(cond, item :: suffix, minCount, maxSize, out, stats)
          }
        }
        tree.pushUp(item)
      }
    }
  }

  /** Root-exclusive ancestor path of a node, in root-to-leaf (rank) order. */
  private def ancestors(n: PSTree#Node): Vector[Event] = {
    var cur = n.parent
    val rev = mutable.ArrayBuffer.empty[Event]
    while (cur != null && cur.item != null) { rev += cur.item; cur = cur.parent }
    rev.reverseIterator.toVector
  }
}
