package repro.workload

import java.util.Random
import repro.core._

/** The 15 TPC-H filter templates of §7.2 (q1, q3–q10, q12, q14, q17–q19,
  * q21 — all templates touching lineitem), instantiated with random
  * literals: 10 seeds per template → 150 queries, exactly as in the paper.
  * Templates are expressed over the *encoded* denormalized table; advanced
  * predicates (q4/q12/q21's date-vs-date filters, q5's nation equality) use
  * the AC indices of `TpchDenorm.advCuts`.
  */
object TpchWorkload {

  val templateNames: IndexedSeq[String] =
    IndexedSeq("q1", "q3", "q4", "q5", "q6", "q7", "q8", "q9", "q10", "q12", "q14", "q17", "q18", "q19", "q21")

  /** @param litDomains per-column literal domains overriding the data's own
    *        bounds — used for the one-month slice, where date literals must
    *        span the FULL TPC-H date domain (§7.2).
    */
  def queries(meta: TableMeta, seedsPerTemplate: Int = 10, seed: Long = 1234,
              litDomains: Map[String, (Double, Double)] = Map.empty): IndexedSeq[Query] =
    for {
      (t, ti) <- templateNames.zipWithIndex
      j <- 0 until seedsPerTemplate
    } yield {
      val rng = new Random(seed + ti * 1000 + j)
      Query(s"$t#$j", template(meta, t, rng, litDomains))
    }

  // --- helpers over the encoded domain ---------------------------------

  private type Domains = Map[String, (Double, Double)]


  private def bounds(meta: TableMeta, dom: Domains, c: String): (Double, Double) =
    dom.getOrElse(c, (meta(c).lo, meta(c).hi))

  /** Random integral literal in [lo + fLo·span, lo + fHi·span]. */
  private def randIn(meta: TableMeta, dom: Domains, c: String, rng: Random,
                     fLo: Double = 0.0, fHi: Double = 1.0): Double = {
    val (l, h) = bounds(meta, dom, c)
    math.floor(l + (fLo + rng.nextDouble() * (fHi - fLo)) * (h - l))
  }

  private def randCat(meta: TableMeta, c: String, rng: Random): Int =
    rng.nextInt(meta(c).domainSize)

  private def distinctCats(meta: TableMeta, c: String, k: Int, rng: Random): Set[Int] = {
    val dom = meta(c).domainSize
    val s = scala.collection.mutable.Set[Int]()
    while (s.size < math.min(k, dom)) s += rng.nextInt(dom)
    s.toSet
  }

  private def codesWithPrefix(meta: TableMeta, c: String, prefix: String): Set[Int] =
    meta(c).dict.get.zipWithIndex.collect { case (v, i) if v.startsWith(prefix) => i }.toSet

  private def dateRange(meta: TableMeta, dom: Domains, c: String, rng: Random,
                        widthDays: Int): (Double, Double) = {
    val (l, h) = bounds(meta, dom, c)
    val start = math.floor(l + rng.nextDouble() * math.max(1.0, h - l - widthDays))
    (start, start + widthDays - 1)
  }

  private def range(c: String, a: Double, b: Double): QExpr =
    QAnd(Seq(QPred(GePred(c, a)), QPred(LePred(c, b))))

  // --- templates --------------------------------------------------------

  private[workload] def template(meta: TableMeta, name: String, rng: Random,
                                 dom: Domains = Map.empty): QExpr = name match {
    case "q1" => // shipdate <= hi − [60,120): selects nearly everything.
      QPred(LePred("l_shipdate", bounds(meta, dom, "l_shipdate")._2 - (60 + rng.nextInt(60))))

    case "q3" =>
      val d = randIn(meta, dom, "o_orderdate", rng, 0.3, 0.7)
      QAnd(Seq(
        QPred(InPred("c_mktsegment", Set(randCat(meta, "c_mktsegment", rng)))),
        QPred(LePred("o_orderdate", d)),
        QPred(GePred("l_shipdate", d))))

    case "q4" =>
      val (a, b) = dateRange(meta, dom, "o_orderdate", rng, 90)
      QAnd(Seq(range("o_orderdate", a, b), QPred(AdvPred(2)))) // l_commitdate < l_receiptdate

    case "q5" =>
      val (a, b) = dateRange(meta, dom, "o_orderdate", rng, 365)
      QAnd(Seq(
        QPred(InPred("c_nationkey", distinctCats(meta, "c_nationkey", 5, rng))),
        QPred(AdvPred(0)), // c_nationkey = s_nationkey
        range("o_orderdate", a, b)))

    case "q6" =>
      val (a, b) = dateRange(meta, dom, "l_shipdate", rng, 365)
      val disc = 2 + rng.nextInt(7) // encoded = raw × 100
      QAnd(Seq(
        range("l_shipdate", a, b),
        range("l_discount", disc - 1, disc + 1),
        QPred(LePred("l_quantity", 24 + rng.nextInt(2)))))

    case "q7" =>
      val n1 = randCat(meta, "s_nationkey", rng)
      val n2 = (n1 + 1 + rng.nextInt(23)) % 25
      val (a, b) = dateRange(meta, dom, "l_shipdate", rng, 730)
      QAnd(Seq(
        QOr(Seq(
          QAnd(Seq(QPred(InPred("s_nationkey", Set(n1))), QPred(InPred("c_nationkey", Set(n2))))),
          QAnd(Seq(QPred(InPred("s_nationkey", Set(n2))), QPred(InPred("c_nationkey", Set(n1))))))),
        range("l_shipdate", a, b)))

    case "q8" =>
      val (a, b) = dateRange(meta, dom, "o_orderdate", rng, 730)
      QAnd(Seq(
        QPred(InPred("p_type", Set(randCat(meta, "p_type", rng)))),
        range("o_orderdate", a, b),
        QPred(InPred("c_nationkey", distinctCats(meta, "c_nationkey", 5, rng)))))

    case "q9" =>
      QPred(InPred("p_type", Set(randCat(meta, "p_type", rng))))

    case "q10" =>
      val (a, b) = dateRange(meta, dom, "o_orderdate", rng, 90)
      val rCode = meta("l_returnflag").dict.get.indexOf("R")
      QAnd(Seq(range("o_orderdate", a, b), QPred(InPred("l_returnflag", Set(rCode)))))

    case "q12" =>
      val (a, b) = dateRange(meta, dom, "l_receiptdate", rng, 365)
      QAnd(Seq(
        QPred(InPred("l_shipmode", distinctCats(meta, "l_shipmode", 2, rng))),
        QPred(AdvPred(1)), // l_shipdate < l_commitdate
        QPred(AdvPred(2)), // l_commitdate < l_receiptdate
        range("l_receiptdate", a, b)))

    case "q14" =>
      val (a, b) = dateRange(meta, dom, "l_shipdate", rng, 30)
      QAnd(Seq(
        range("l_shipdate", a, b),
        QPred(InPred("p_type", Set(meta("p_type").dict.get.indexOf("PROMO"))))))

    case "q17" =>
      QAnd(Seq(
        QPred(InPred("p_brand", Set(randCat(meta, "p_brand", rng)))),
        QPred(InPred("p_container", Set(randCat(meta, "p_container", rng)))),
        QPred(LePred("l_quantity", 3 + rng.nextInt(5)))))

    case "q18" =>
      QPred(GePred("l_quantity", 45 + rng.nextInt(4)))

    case "q19" =>
      def block(prefix: String, qlo: Int, qspan: Int, sizeHi: Int): QExpr = {
        val brand = randCat(meta, "p_brand", rng)
        val containers = codesWithPrefix(meta, "p_container", prefix)
        QAnd(Seq(
          QPred(InPred("p_brand", Set(brand))),
          QPred(InPred("p_container", containers)),
          range("l_quantity", qlo, qlo + qspan),
          range("p_size", 1, sizeHi)))
      }
      QOr(Seq(
        block("SM", 1 + rng.nextInt(10), 10, 5),
        block("MED", 10 + rng.nextInt(10), 10, 10),
        block("LG", 20 + rng.nextInt(10), 10, 15)))

    case "q21" =>
      val fCode = meta("o_orderstatus").dict.get.indexOf("F")
      QAnd(Seq(
        QPred(AdvPred(2)), // l_receiptdate > l_commitdate
        QPred(InPred("s_nationkey", Set(randCat(meta, "s_nationkey", rng)))),
        QPred(InPred("o_orderstatus", Set(fCode)))))

    case other => throw new IllegalArgumentException(s"unknown template $other")
  }
}
