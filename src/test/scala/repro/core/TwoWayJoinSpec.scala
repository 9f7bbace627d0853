package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.tag.Tup

/** §4 two-way joins on the paper's Figure 2 / Figure 3 examples plus
  * randomized cross-checks against a brute-force join.
  */
class TwoWayJoinSpec extends AnyFunSuite {
  import TestDb._

  private val b = JoinAttr("b", Map("R" -> "b", "S" -> "b"))

  /** Figure 2: R(A,B), S(B,C); b1 joins 3×3, b2/b3 dangle. */
  private val figR = rel("R", Seq("a", "b"), Seq("a", "b"),
    Seq(Seq("a1", "b1"), Seq("a2", "b1"), Seq("a3", "b1"), Seq("a4", "b2")))
  private val figS = rel("S", Seq("b", "c"), Seq("b", "c"),
    Seq(Seq("b1", "c1"), Seq("b1", "c2"), Seq("b1", "c3"), Seq("b3", "c4")))

  private def spec0 = TwoWaySpec("R", "S", b,
    carry = Map("R" -> Seq("a", "b"), "S" -> Seq("c")))

  test("Figure 2: join value b1 produces the 3x3 product; b2, b3 are eliminated") {
    val (out, _) = TwoWayJoin.run(engine(figR, figS), spec0)
    assert(out.size == 9)
    assert(out.forall(_("b") == "b1"))
    assert(out.map(_("a")).toSet == Set("a1", "a2", "a3"))
    assert(out.map(_("c")).toSet == Set("c1", "c2", "c3"))
  }

  test("Figure 2: communication is bounded by min(IN, OUT) per reduction phase") {
    val (_, stats) = TwoWayJoin.run(engine(figR, figS), spec0)
    val in = figR.rows.size + figS.rows.size
    // superstep 1 signals only joining tuples; superstep 2 replies likewise
    assert(stats.messagesPerStep(0) <= in)
    assert(stats.messagesPerStep(1) <= in)
  }

  test("Figure 2: three supersteps suffice") {
    val (_, stats) = TwoWayJoin.run(engine(figR, figS), spec0)
    assert(stats.supersteps <= 4)
  }

  test("factorized output keeps the two sides unexpanded") {
    val (fact, _) = TwoWayJoin.runFactorized(engine(figR, figS), spec0)
    assert(fact.size == 1)
    val (v, l, r) = fact.head
    assert(v == "b1" && l.size == 3 && r.size == 3) // 3+3 stored vs 9 expanded
  }

  test("tuple filters prune during the reply superstep") {
    val f = spec0.copy(tupleFilter = Map("R" -> ((t: Tup) => t("a") != "a1")))
    val (out, _) = TwoWayJoin.run(engine(figR, figS), f)
    assert(out.size == 6)
  }

  // ------------------------------------------------------------ outer joins
  test("left outer join keeps dangling R tuples null-padded") {
    val (out, _) = TwoWayJoin.run(engine(figR, figS), spec0.copy(joinType = JoinType.Left))
    assert(out.size == 10)
    val dangling = out.filter(_("a") == "a4")
    assert(dangling.size == 1 && dangling.head("c") == null)
  }

  test("right outer join keeps dangling S tuples") {
    val (out, _) = TwoWayJoin.run(engine(figR, figS), spec0.copy(joinType = JoinType.Right))
    assert(out.size == 10 && out.exists(_("c") == "c4"))
  }

  test("full outer join keeps both sides' dangling tuples") {
    val (out, _) = TwoWayJoin.run(engine(figR, figS), spec0.copy(joinType = JoinType.Full))
    assert(out.size == 11)
  }

  test("null join keys surface via the driver-side completion for outer joins") {
    val rN = rel("R", Seq("a", "b"), Seq("a", "b"), Seq(Seq("a1", "b1"), Seq("a9", null)))
    val sN = rel("S", Seq("b", "c"), Seq("b", "c"), Seq(Seq("b1", "c1")))
    val (out, _) = TwoWayJoin.run(engine(rN, sN),
      TwoWaySpec("R", "S", b, joinType = JoinType.Left,
        carry = Map("R" -> Seq("a"), "S" -> Seq("c"))),
      relRows = Map("R" -> rN.rows.toVector))
    assert(out.size == 2)
    assert(out.exists(t => t("a") == "a9" && t("c") == null))
  }

  // -------------------------------------------------- §4.2 multi-attribute
  /** Figure 3: R(A,B,C) ⋈ S(A,B,D) — b2 joins R2/R3 with S2 on B but they
    * disagree on A, so the intersection eliminates them.
    */
  private val f3R = rel("R", Seq("a", "b", "c"), Seq("a", "b"),
    Seq(Seq("a1", "b1", "c1"), Seq("a2", "b2", "c2"), Seq("a2", "b2", "c3")))
  private val f3S = rel("S", Seq("a", "b", "d"), Seq("a", "b"),
    Seq(Seq("a1", "b1", "d1"), Seq("a3", "b2", "d2")))

  test("Figure 3: multi-attribute join intersects the secondary attribute") {
    val specM = TwoWaySpec("R", "S",
      JoinAttr("b", Map("R" -> "b", "S" -> "b")),
      others = Seq(JoinAttr("a", Map("R" -> "a", "S" -> "a"))),
      carry = Map("R" -> Seq("a", "b", "c"), "S" -> Seq("d")))
    val (out, stats) = TwoWayJoin.run(engine(f3R, f3S), specM)
    assert(out == Vector(Map("a" -> "a1", "b" -> "b1", "c" -> "c1", "d" -> "d1")))
    assert(stats.supersteps <= 6)
  }

  test("multi-attribute join equals single-attribute join when attrs coincide") {
    val specM = TwoWaySpec("R", "S", b,
      others = Seq(JoinAttr("b2", Map("R" -> "b", "S" -> "b"))),
      carry = Map("R" -> Seq("a", "b"), "S" -> Seq("c")))
    val (m, _) = TwoWayJoin.run(engine(figR, figS), specM)
    val (s1, _) = TwoWayJoin.run(engine(figR, figS), spec0)
    assert(sameBag(m, s1))
  }

  // ------------------------------------------------------- randomized check
  test("randomized two-way joins match the brute-force reference") {
    val rnd = new scala.util.Random(42)
    for (trial <- 1 to 25) {
      val nR = 1 + rnd.nextInt(8); val nS = 1 + rnd.nextInt(8); val dom = 1 + rnd.nextInt(4)
      val rr = rel("R", Seq("a", "b"), Seq("a", "b"),
        (1 to nR).map(i => Seq[Any](rnd.nextInt(dom), rnd.nextInt(dom))))
      val ss = rel("S", Seq("b2", "c"), Seq("b2", "c"),
        (1 to nS).map(i => Seq[Any](rnd.nextInt(dom), rnd.nextInt(dom))))
      val j = JoinAttr("b", Map("R" -> "b", "S" -> "b2"))
      val (out, _) = TwoWayJoin.run(engine(rr, ss),
        TwoWaySpec("R", "S", j, carry = Map("R" -> Seq("a", "b"), "S" -> Seq("b2", "c"))))
      val ref = clean(refJoin(Seq(rr, ss), Seq(j)))
      assert(sameBag(out, ref), s"trial $trial: got ${out.size}, want ${ref.size}")
    }
  }
}
