package repro.baseline

import scala.collection.mutable
import repro.core.Event

/** A *periodic summary* (Kiran et al. 2019): a compressed run of granule
  * occurrences `[start, end]` holding `count` occurrences, every
  * consecutive pair within `maxPer`. Summary lists replace full ts-lists in
  * the PS-tree — the memory-saving idea of PS-growth.
  */
final case class Summary(start: Int, end: Int, count: Int) {
  require(start <= end && count >= 1, s"bad summary [$start,$end]x$count")
}

object Summary {
  /** Append one timestamp (>= all recorded) to a summary list. */
  def add(list: Vector[Summary], ts: Int, maxPer: Int): Vector[Summary] =
    list.lastOption match {
      case Some(s) if ts - s.end <= maxPer && ts >= s.end =>
        // A granule's transaction is inserted once, but merged branches can
        // carry equal endpoints — never double-count an identical ts.
        if (ts == s.end) list
        else list.init :+ Summary(s.start, ts, s.count + 1)
      case _ => list :+ Summary(ts, ts, 1)
    }

  /** Merge two summary lists (union of runs, maxPer-merged). Counts are
    * summed — the total occurrence count is preserved exactly, which keeps
    * the support-based qualification sound.
    */
  def merge(a: Vector[Summary], b: Vector[Summary], maxPer: Int): Vector[Summary] = {
    if (a.isEmpty) b
    else if (b.isEmpty) a
    else {
      val all = (a ++ b).sortBy(s => (s.start, s.end))
      val out = Vector.newBuilder[Summary]
      var cur = all.head
      for (s <- all.iterator.drop(1)) {
        if (s.start - cur.end <= maxPer)
          cur = Summary(cur.start, math.max(cur.end, s.end), cur.count + s.count)
        else { out += cur; cur = s }
      }
      out += cur
      out.result()
    }
  }

  def totalCount(list: Vector[Summary]): Int = list.iterator.map(_.count).sum
}

/** The PS-tree: an FP-tree-family prefix tree over granule transactions
  * whose tail nodes carry periodic summaries instead of full ts-lists.
  *
  * Items (events) are ranked by descending support; each transaction is
  * inserted in rank order so shared prefixes collapse. A header table links
  * all nodes of an item for the pattern-growth pass.
  */
final class PSTree(val maxPer: Int, val rank: Map[Event, Int]) {

  final class Node(val item: Event, val parent: Node) {
    val children: mutable.HashMap[Event, Node] = mutable.HashMap.empty
    var summaries: Vector[Summary] = Vector.empty
    var headerNext: Node = _
  }

  val root = new Node(null, null)
  /** First header link per item, in rank order. */
  val header: mutable.LinkedHashMap[Event, Node] = mutable.LinkedHashMap.empty
  private var nodes = 0

  def nodeCount: Int = nodes

  /** Insert one granule transaction (already rank-sorted, rank-filtered)
    * occurring at granule `ts`; its summary lands on the tail node.
    */
  def insert(items: Seq[Event], ts: Int): Unit = insertWith(items, Vector(Summary(ts, ts, 1)))

  /** Insert a rank-sorted path carrying pre-built summaries (used when
    * constructing conditional trees).
    */
  def insertWith(items: Seq[Event], summaries: Vector[Summary]): Unit = {
    var cur = root
    for (it <- items) {
      cur = cur.children.getOrElseUpdate(it, {
        val n = new Node(it, cur)
        nodes += 1
        header.get(it) match {
          case Some(first) => n.headerNext = first
          case None        =>
        }
        header.update(it, n)
        n
      })
    }
    if (cur ne root) cur.summaries = Summary.merge(cur.summaries, summaries, maxPer)
  }

  def nodesOf(item: Event): Vector[Node] = {
    val out = Vector.newBuilder[Node]
    var n = header.getOrElse(item, null)
    while (n != null) { out += n; n = n.headerNext }
    out.result()
  }

  /** Items in ascending rank processing order (least frequent first), the
    * bottom-up order of pattern growth.
    */
  def itemsBottomUp: Vector[Event] = header.keysIterator.toVector.sortBy(e => -rank(e))

  /** Push a processed item's summaries up to its parents and detach its
    * nodes — the PF/PS-growth "push-up" step.
    */
  def pushUp(item: Event): Unit = {
    for (n <- nodesOf(item)) {
      if (n.parent ne root)
        n.parent.summaries = Summary.merge(n.parent.summaries, n.summaries, maxPer)
      n.parent.children.remove(n.item)
      nodes -= 1
    }
    header.remove(item)
  }
}

object PSTree {
  /** Build a PS-tree from granule transactions `(ts, items)`, keeping only
    * items with support >= minCount, ranked by descending support.
    */
  def build(transactions: Seq[(Int, Set[Event])], maxPer: Int, minCount: Int): PSTree = {
    val support = mutable.HashMap.empty[Event, Int]
    for ((_, items) <- transactions; it <- items)
      support.update(it, support.getOrElse(it, 0) + 1)
    val kept = support.filter(_._2 >= minCount)
    val rank = kept.toVector.sortBy { case (e, c) => (-c, e.key) }
      .zipWithIndex.map { case ((e, _), i) => e -> i }.toMap
    val tree = new PSTree(maxPer, rank)
    for ((ts, items) <- transactions.sortBy(_._1)) {
      val sorted = items.filter(rank.contains).toVector.sortBy(rank)
      if (sorted.nonEmpty) tree.insert(sorted, ts)
    }
    tree
  }
}
