package repro.layout

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType
import scala.collection.immutable.BitSet
import repro.core._

/** Bottom-Up row grouping, Sun et al. SIGMOD'14 (§2.2.2, §7.3) — the
  * state-of-the-art comparator the paper evaluates against.
  *
  * Pipeline:
  *  1. *Feature selection*: candidate cuts become features; features are
  *     topologically ordered by subsumption, then chosen greedily by query
  *     frequency with frequency discounting of features sharing subsumed
  *     queries (§7.3). BU+ additionally drops features with selectivity
  *     above a threshold (the paper's tuning that rescued the ErrorLogs).
  *  2. Every tuple maps to an M-bit *feature vector*; unique vectors start
  *     as singleton blocks (with multiplicity = row weight).
  *  3. *Greedy merging*: repeatedly merge the pair of blocks (at least one
  *     below size b) with the lowest penalty — the increase in scan cost
  *     caused by OR-ing their vectors — until every block has ≥ b rows.
  */
object BottomUp {

  /** Does predicate p imply feature f (p is stricter)? Conservative,
    * syntactic — the same check Sun et al. use for query subsumption.
    */
  def predImplies(p: Pred, f: Pred): Boolean = (p, f) match {
    case (LePred(c1, v1), LePred(c2, v2))   => c1 == c2 && v1 <= v2
    case (GePred(c1, v1), GePred(c2, v2))   => c1 == c2 && v1 >= v2
    case (InPred(c1, s1), InPred(c2, s2))   => c1 == c2 && s1.subsetOf(s2)
    case (AdvPred(i1, p1), AdvPred(i2, p2)) => i1 == i2 && p1 == p2
    case _                                  => false
  }

  /** Is query q subsumed by (stricter than) feature f? For a conjunction it
    * suffices that one conjunct implies f; a disjunction requires all
    * disjuncts to.
    */
  def queryImplies(q: QExpr, f: Pred): Boolean = q match {
    case QPred(p) => predImplies(p, f)
    case QAnd(cs) => cs.exists(queryImplies(_, f))
    case QOr(cs)  => cs.forall(queryImplies(_, f))
  }

  /** Feature selection (§7.3). `maxSelectivity = 1.0` reproduces the
    * original (untuned) Bottom-Up; `0.1` is the paper's BU+ tuning.
    */
  def selectFeatures(
      w: Seq[QExpr],
      cuts: IndexedSeq[Pred],
      store: ColumnStore,
      maxFeatures: Int = 15,
      maxSelectivity: Double = 1.0,
      minFreq: Int = 1): IndexedSeq[Pred] = {
    val candidates = cuts.distinct.filter { f =>
      store.selectivity(QPred(f)) <= maxSelectivity
    }
    // Subsumed-query sets per feature.
    val qsets: Map[Pred, BitSet] = candidates.map { f =>
      f -> BitSet.fromSpecific(w.indices.filter(i => queryImplies(w(i), f)))
    }.toMap
    val freq = scala.collection.mutable.Map[Pred, Int](candidates.map(f => f -> qsets(f).size): _*)
    val remaining = scala.collection.mutable.LinkedHashSet[Pred](candidates: _*)
    val chosen = scala.collection.mutable.ArrayBuffer[Pred]()

    while (chosen.size < maxFeatures && remaining.nonEmpty) {
      // Features not subsumed by any other remaining feature come first
      // (topological order by subsumption).
      val eligible = remaining.filter(f =>
        !remaining.exists(g => g != f && predImplies(f, g)))
      val pool = if (eligible.nonEmpty) eligible else remaining
      val best = pool.maxBy(f => freq(f))
      if (freq(best) < minFreq) {
        remaining.clear()
      } else {
        chosen += best
        remaining -= best
        // Discount: shared subsumed queries no longer add value.
        for (f <- remaining) freq(f) = freq(f) - (qsets(f) & qsets(best)).size
        remaining.filterInPlace(f => freq(f) >= minFreq)
      }
    }
    chosen.toIndexedSeq
  }

  /** The layout: feature predicates, unique-vector -> block id mapping, and
    * per-block sizes.
    */
  final case class Layout(
      meta: TableMeta,
      features: IndexedSeq[Pred],
      vecToBid: Map[Long, Int],
      blockSizes: IndexedSeq[Long]) {
    def nBlocks: Int = blockSizes.length

    /** Catalyst expression computing the feature vector of a row. */
    def vecColumn: Column =
      features.zipWithIndex
        .map { case (f, i) => when(f.toColumn(meta), lit(1L << i)).otherwise(lit(0L)) }
        .reduceOption(_ + _)
        .getOrElse(lit(0L))

    /** Add the block-id column to an encoded DataFrame. */
    def assign(df: DataFrame): DataFrame = {
      val m = vecToBid
      val lookup = udf((v: Long) => m.getOrElse(v, 0))
      df.withColumn("bid", lookup(vecColumn).cast(IntegerType))
    }
  }

  /** Build the layout over the full encoded DataFrame: compute unique
    * feature vectors + counts in Spark, cluster on the driver.
    */
  def build(
      df: DataFrame,
      meta: TableMeta,
      w: Seq[QExpr],
      features: IndexedSeq[Pred],
      b: Long,
      maxVectors: Int = 4000): Layout = {
    val vecExpr = features.zipWithIndex
      .map { case (f, i) => when(f.toColumn(meta), lit(1L << i)).otherwise(lit(0L)) }
      .reduceOption(_ + _)
      .getOrElse(lit(0L))
    val uniq = df.groupBy(vecExpr.as("vec")).count().collect()
      .map(r => (r.getAs[Long]("vec"), r.getAs[Long]("count")))
    cluster(meta, w, features, uniq.toIndexedSeq, b, maxVectors)
  }

  /** Greedy bottom-up clustering of unique feature vectors (§2.2.2). */
  def cluster(
      meta: TableMeta,
      w: Seq[QExpr],
      features: IndexedSeq[Pred],
      uniqueVectors: IndexedSeq[(Long, Long)],
      b: Long,
      maxVectors: Int = 4000): Layout = {
    // Query set subsumed by each feature (for scan-cost bookkeeping).
    val qsets: IndexedSeq[BitSet] = features.map { f =>
      BitSet.fromSpecific(w.indices.filter(i => queryImplies(w(i), f)))
    }
    // A block whose vector has bit i = 0 lets every query in qsets(i) skip
    // it. Scan weight = # queries that cannot skip.
    val weightMemo = scala.collection.mutable.Map[Long, Int]()
    def weight(vec: Long): Int = weightMemo.getOrElseUpdate(vec, {
      var skippable = BitSet.empty
      for (i <- features.indices if (vec & (1L << i)) == 0) skippable |= qsets(i)
      w.length - skippable.size
    })

    // Merging loop state. `members` tracks the ORIGINAL unique vectors a
    // block absorbed — they key the final vector->bid assignment map.
    final case class Blk(vec: Long, size: Long, members: List[Long])
    val blocks = scala.collection.mutable.ArrayBuffer[Blk](
      uniqueVectors.sortBy(-_._2).map { case (v, c) => Blk(v, c, List(v)) }: _*)

    // Pre-reduce pathological vector counts: merge the smallest-count
    // blocks into the Hamming-nearest survivor among the head.
    if (blocks.length > maxVectors) {
      val tail = blocks.drop(maxVectors).toIndexedSeq
      blocks.remove(maxVectors, blocks.length - maxVectors)
      for (t <- tail) {
        val ni = blocks.indices.minBy(i => java.lang.Long.bitCount(blocks(i).vec ^ t.vec))
        val host = blocks(ni)
        blocks(ni) = Blk(host.vec | t.vec, host.size + t.size, t.members ++ host.members)
      }
    }

    def penalty(a: Blk, bb: Blk): Double = {
      val u = a.vec | bb.vec
      (a.size + bb.size).toDouble * weight(u) - a.size * weight(a.vec) - bb.size * weight(bb.vec)
    }

    var canMerge = true
    while (canMerge && blocks.length > 1) {
      val smallIdx = blocks.indices.filter(i => blocks(i).size < b)
      if (smallIdx.isEmpty) canMerge = false
      else {
        var bi = -1; var bj = -1; var bp = Double.PositiveInfinity
        for (i <- smallIdx; j <- blocks.indices if j != i) {
          val p = penalty(blocks(i), blocks(j))
          // First-wins tie-break keeps the result deterministic.
          if (p < bp) { bp = p; bi = i; bj = j }
        }
        val a = blocks(bi); val c = blocks(bj)
        val merged = Blk(a.vec | c.vec, a.size + c.size, a.members ++ c.members)
        val (hiI, loI) = if (bi > bj) (bi, bj) else (bj, bi)
        blocks.remove(hiI); blocks.remove(loI)
        blocks += merged
      }
    }

    val vecToBid = blocks.zipWithIndex.flatMap { case (blk, bid) => blk.members.map(_ -> bid) }.toMap
    Layout(meta, features, vecToBid, blocks.map(_.size).toIndexedSeq)
  }
}
