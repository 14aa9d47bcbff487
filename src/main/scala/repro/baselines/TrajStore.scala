package repro.baselines

import repro.core._
import scala.collection.mutable

/** TrajStore [10]: an adaptive quadtree storage layer. Points stream in;
  * a leaf splits into four when it exceeds `maxPerLeaf`. Summaries are
  * computed per spatial cell — bounded codebooks for the Tables 5/6
  * protocol, or a codeword budget distributed proportionally to cell
  * counts for the Table 2 protocol (as §6.2.1 describes). */
final class TrajStoreIndex(val bbox: Rect, val maxPerLeaf: Int = 1500) {

  final class Leaf(var rect: Rect) {
    val pts = mutable.ArrayBuffer.empty[(Int, Int, Pt)] // (trajId, t, p)
  }

  sealed trait Node
  final case class Inner(rect: Rect, children: Array[Node]) extends Node
  final case class LeafNode(leaf: Leaf) extends Node

  private var root: Node = LeafNode(new Leaf(bbox))
  var splitOps = 0

  private def childRects(r: Rect): Array[Rect] = {
    val mx = (r.x0 + r.x1) / 2; val my = (r.y0 + r.y1) / 2
    Array(Rect(r.x0, r.y0, mx, my), Rect(mx, r.y0, r.x1, my),
          Rect(r.x0, my, mx, r.y1), Rect(mx, my, r.x1, r.y1))
  }

  private def insertInto(node: Node, id: Int, t: Int, p: Pt): Node = node match {
    case LeafNode(leaf) =>
      leaf.pts += ((id, t, p))
      if (leaf.pts.length > maxPerLeaf && leaf.rect.width > 1e-7) {
        splitOps += 1
        val rects = childRects(leaf.rect)
        val children: Array[Node] = rects.map(r => LeafNode(new Leaf(r)): Node)
        val inner = Inner(leaf.rect, children)
        for ((iid, it, ip) <- leaf.pts) descend(inner, iid, it, ip)
        inner
      } else node
    case Inner(rect, children) =>
      descend(node.asInstanceOf[Inner], id, t, p)
      node
  }

  private def descend(inner: Inner, id: Int, t: Int, p: Pt): Unit = {
    var ci = 0
    var placed = false
    while (ci < 4 && !placed) {
      inner.children(ci) match {
        case LeafNode(l) if l.rect.contains(p) =>
          inner.children(ci) = insertInto(inner.children(ci), id, t, p)
          placed = true
        case in @ Inner(r, _) if r.contains(p) =>
          descend(in, id, t, p)
          placed = true
        case _ =>
      }
      ci += 1
    }
    if (!placed) {
      // numeric edge: clamp to the last child
      inner.children(3) = insertInto(inner.children(3), id, t, p)
    }
  }

  def insert(id: Int, t: Int, p: Pt): Unit = { root = insertInto(root, id, t, p) }

  def leaves: Seq[Leaf] = {
    val out = mutable.ArrayBuffer.empty[Leaf]
    def rec(n: Node): Unit = n match {
      case LeafNode(l) => out += l
      case Inner(_, cs) => cs.foreach(rec)
    }
    rec(root)
    out.toSeq
  }

  def leafOf(p: Pt): Leaf = {
    var n = root
    while (true) {
      n match {
        case LeafNode(l) => return l
        case Inner(_, cs) =>
          n = cs.find {
            case LeafNode(l) => l.rect.contains(p)
            case Inner(r, _) => r.contains(p)
          }.getOrElse(cs(3))
      }
    }
    throw new IllegalStateException("unreachable")
  }

  /** Trajectory ids stored in the leaf cell of p at time t. */
  def query(p: Pt, t: Int): Array[Int] =
    leafOf(p).pts.collect { case (id, tt, _) if tt == t => id }.distinct.toArray
}

object TrajStoreQuant {

  /** Tables 5/6: per-leaf error-bounded codebooks over the leaf's points.
    * Returns (reconstruction per (id,t), total codewords). */
  def summarizeBounded(idx: TrajStoreIndex, epsDeg: Double): (Map[(Int, Int), Pt], Int) = {
    val recon = mutable.HashMap.empty[(Int, Int), Pt]
    var words = 0
    for (leaf <- idx.leaves if leaf.pts.nonEmpty) {
      val cb = new ErrorBoundedCodebook(epsDeg)
      for ((id, t, p) <- leaf.pts) recon((id, t)) = cb(cb.quantize(p))
      words += cb.size
    }
    (recon.toMap, words)
  }

  /** Table 2 protocol: distribute a total codeword budget v over leaves
    * proportionally to the number of this timestamp's points they hold,
    * then k-means each leaf's points with its share. */
  def summarizeBudgetAt(idx: TrajStoreIndex, t: Int, v: Int, seed: Long): Map[Int, Pt] = {
    val out = mutable.HashMap.empty[Int, Pt]
    val leaves = idx.leaves.map(l => (l, l.pts.filter(_._2 == t))).filter(_._2.nonEmpty)
    val total = leaves.map(_._2.length).sum
    if (total == 0) return Map.empty
    for ((leaf, pts) <- leaves) {
      val share = math.max(1, math.round(v.toDouble * pts.length / total).toInt)
      val arr = pts.map(_._3).toArray
      val (cents, assign) = KMeans.clusterPts(arr, share, seed = seed)
      var i = 0
      while (i < pts.length) { out(pts(i)._1) = cents(assign(i)); i += 1 }
    }
    out.toMap
  }
}
