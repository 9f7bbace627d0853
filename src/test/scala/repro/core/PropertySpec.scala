package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck properties for the algebraic building blocks and randomized
  * end-to-end join equivalence against the brute-force reference.
  */
class PropertySpec extends AnyFunSuite {
  import TestDb._

  /** Minimal scalatest↔scalacheck bridge (scalatestplus is not available
    * offline): run the property and fail the test on the first counterexample.
    */
  private def check(p: Prop, n: Int = 50): Unit = {
    val params = org.scalacheck.Test.Parameters.default.withMinSuccessfulTests(n)
    val res = org.scalacheck.Test.check(params, p)
    assert(res.passed, res.status.toString)
  }

  private def ja(name: String, cols: (String, String)*) = JoinAttr(name, cols.toMap)

  private val smallKey: Gen[Long] = Gen.chooseNum(0L, 3L)
  private def relGen(name: String, cols: Seq[String]): Gen[repro.tag.TagRelation] =
    for {
      n <- Gen.chooseNum(0, 7)
      rows <- Gen.listOfN(n, Gen.listOfN(cols.size, smallKey))
    } yield rel(name, cols, cols, rows.map(_.map(v => v: Any)))

  test("property: two-way TAG-join equals brute force") {
    check(Prop.forAll(relGen("R", Seq("a", "b")), relGen("S", Seq("b2", "c"))) { (r, s) =>
      val j = ja("b", "R" -> "b", "S" -> "b2")
      val (out, _) = TwoWayJoin.run(engine(r, s),
        TwoWaySpec("R", "S", j, carry = Map("R" -> Seq("a", "b"), "S" -> Seq("b2", "c"))))
      sameBag(out, clean(refJoin(Seq(r, s), Seq(j))))
    }, 40)
  }

  test("property: three-way chain TAG-join equals brute force") {
    check(Prop.forAll(relGen("A", Seq("x", "p")), relGen("B", Seq("x", "y")),
        relGen("C", Seq("y", "q"))) { (a, b, c) =>
      val joins = Seq(ja("x", "A" -> "x", "B" -> "x"), ja("y", "B" -> "y", "C" -> "y"))
      val out = executor(a, b, c).execute(QuerySpec(Seq("A", "B", "C"), joins,
        carry = Map("A" -> Seq("x", "p"), "B" -> Seq("x", "y"), "C" -> Seq("y", "q"))))
      sameBag(out.rows, clean(refJoin(Seq(a, b, c), joins)))
    }, 30)
  }

  test("property: triangle cycle join equals brute force for any theta") {
    check(Prop.forAll(relGen("R", Seq("a", "b")), relGen("S", Seq("b", "c")),
        relGen("T", Seq("c", "a")), Gen.oneOf(Option.empty[Double], Some(0.0), Some(1.5))) {
      (r, s, t, theta) =>
        val spec = CycleSpec(Vector("R", "S", "T"),
          Vector(ja("A", "T" -> "a", "R" -> "a"), ja("B", "R" -> "b", "S" -> "b"),
            ja("C", "S" -> "c", "T" -> "c")),
          carry = Map("R" -> Seq("a", "b"), "S" -> Seq("b", "c"), "T" -> Seq("c", "a")),
          theta = theta)
        val (out, _) = CycleJoin.run(engine(r, s, t), spec)
        val ref = clean(refJoin(Seq(r, s, t), Seq(
          ja("A", "R" -> "a", "T" -> "a"), ja("B", "R" -> "b", "S" -> "b"),
          ja("C", "S" -> "c", "T" -> "c"))))
        sameBag(out, ref)
    }, 25)
  }

  test("property: scalar COUNT equals brute-force cardinality") {
    check(Prop.forAll(relGen("A", Seq("x")), relGen("B", Seq("x"))) { (a, b) =>
      val joins = Seq(ja("x", "A" -> "x", "B" -> "x"))
      val out = executor(a, b).execute(QuerySpec(Seq("A", "B"), joins,
        aggs = Seq(AggSpec(AggFunc.Count, _ => 1.0, "c")), aggMode = AggMode.Scalar))
      out.rows.head("c") == refJoin(Seq(a, b), joins).size.toDouble ||
        (refJoin(Seq(a, b), joins).isEmpty && out.rows.head("c") == 0.0)
    }, 40)
  }

  test("property: AggCell merge is commutative and associative (up to fp)") {
    val cell = Gen.listOf(Gen.chooseNum(-50.0, 50.0)).map(_.foldLeft(AggCell.zero)(_ add _))
    def close(x: AggCell, y: AggCell): Boolean =
      math.abs(x.sum - y.sum) < 1e-9 && x.count == y.count && x.min == y.min && x.max == y.max
    check(Prop.forAll(cell, cell)((a, b) => close(a.merge(b), b.merge(a))))
    check(Prop.forAll(cell, cell, cell)((a, b, c) =>
      close(a.merge(b).merge(c), a.merge(b.merge(c)))))
  }

  test("property: JoinMsg.Ids merge preserves all senders") {
    check(Prop.forAll(Gen.listOf(Gen.long), Gen.listOf(Gen.long)) { (a, b) =>
      JoinMsg.merge(JoinMsg.Ids(a), JoinMsg.Ids(b)) match {
        case JoinMsg.Ids(m) => m.toSet == (a ++ b).toSet && m.size == a.size + b.size
        case _              => false
      }
    })
  }

  test("property: Tables merge concatenates per tag") {
    val tab = Gen.listOf(Gen.chooseNum(0, 5)).map(_.map(i => Map[String, Any]("v" -> i)).toVector)
    check(Prop.forAll(tab, tab) { (x, y) =>
      (JoinMsg.merge(JoinMsg.Tables(Map("t" -> x)), JoinMsg.Tables(Map("t" -> y))),
        JoinMsg.merge(JoinMsg.Tables(Map("t" -> x)), JoinMsg.Tables(Map("u" -> y)))) match {
        case (JoinMsg.Tables(m1), JoinMsg.Tables(m2)) =>
          m1("t").size == x.size + y.size && m2("t") == x && m2("u") == y
        case _ => false
      }
    })
  }

  test("property: ValueKey.normalize is idempotent") {
    val anyVal: Gen[Any] = Gen.oneOf(
      Gen.long.map(l => l: Any), Gen.alphaStr.map(s => s: Any),
      Gen.chooseNum(-10000, 10000).map(d => java.sql.Date.valueOf(
        java.time.LocalDate.ofEpochDay(d.toLong)): Any),
      Gen.double.map(d => d: Any))
    check(Prop.forAll(anyVal) { v =>
      val n = repro.tag.ValueKey.normalize(v)
      repro.tag.ValueKey.normalize(n) == n
    })
  }

  test("property: natural join is commutative up to column union") {
    val tab = Gen.listOf(Gen.zip(Gen.chooseNum(0, 3), Gen.chooseNum(0, 3)))
      .map(_.map { case (k, v) => Map[String, Any]("k" -> k, "v" -> v) }.toVector)
    val tab2 = Gen.listOf(Gen.zip(Gen.chooseNum(0, 3), Gen.chooseNum(0, 3)))
      .map(_.map { case (k, w) => Map[String, Any]("k" -> k, "w" -> w) }.toVector)
    check(Prop.forAll(tab, tab2) { (x, y) =>
      sameBag(RowTable.naturalJoin(x, y), RowTable.naturalJoin(y, x))
    })
  }

  test("property: Partials merge is order-insensitive") {
    val rows = Gen.listOf(Gen.zip(Gen.oneOf("a", "b"), Gen.chooseNum(0.0, 9.0)))
      .map(_.map { case (g, v) => Map[String, Any]("g" -> g, "v" -> v) }.toVector)
    val aggs = Seq(AggSpec(AggFunc.Sum, t => t("v").asInstanceOf[Double], "s"))
    check(Prop.forAll(rows, rows) { (x, y) =>
      Partials.ofRows(x, Seq("g"), aggs).merge(Partials.ofRows(y, Seq("g"), aggs)) ==
        Partials.ofRows(y, Seq("g"), aggs).merge(Partials.ofRows(x, Seq("g"), aggs))
    })
  }
}
