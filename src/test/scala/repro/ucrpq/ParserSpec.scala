package repro.ucrpq

import org.scalatest.funsuite.AnyFunSuite

class ParserSpec extends AnyFunSuite {

  test("single recursion (C1)") {
    val q = UcrpqParser.parse("?x, ?y <- ?x a+ ?y")
    assert(q == Query(List("x", "y"), List(Conjunct(QVar("x"), Plus(Label("a")), QVar("y")))))
  }

  test("filter right of recursion (C2)") {
    val q = UcrpqParser.parse("?x <- ?x a+ C")
    assert(q == Query(List("x"), List(Conjunct(QVar("x"), Plus(Label("a")), QConst("C")))))
  }

  test("filter left of recursion (C3)") {
    val q = UcrpqParser.parse("?x <- C a+ ?x")
    assert(q == Query(List("x"), List(Conjunct(QConst("C"), Plus(Label("a")), QVar("x")))))
  }

  test("concatenations (C4, C5)") {
    assert(UcrpqParser.parse("?x,?y <- ?x a+/b ?y").conjuncts.head.path ==
      Concat(List(Plus(Label("a")), Label("b"))))
    assert(UcrpqParser.parse("?x,?y <- ?x b/a+ ?y").conjuncts.head.path ==
      Concat(List(Label("b"), Plus(Label("a")))))
  }

  test("concatenated recursions (C6)") {
    assert(UcrpqParser.parse("?x,?y <- ?x a+/b+ ?y").conjuncts.head.path ==
      Concat(List(Plus(Label("a")), Plus(Label("b")))))
  }

  test("inverse labels") {
    assert(UcrpqParser.parse("?a <- ?a (actedIn/-actedIn)+ Kevin_Bacon").conjuncts.head.path ==
      Plus(Concat(List(Label("actedIn"), Inv("actedIn")))))
  }

  test("unicode arrow") {
    val q = UcrpqParser.parse("?x ← ?x a+ C")
    assert(q.heads == List("x"))
  }

  test("alternation with pipes") {
    assert(UcrpqParser.parse("?a,?b <- ?a (isL|dw)+ ?b").conjuncts.head.path ==
      Plus(Alt(List(Label("isL"), Label("dw")))))
  }

  test("alternation with spaces (paper's Q21 style)") {
    val q = UcrpqParser.parse("?a,?b <- ?a (isL dw rdfs:subClassOf isConnectedTo)+ ?b")
    assert(q.conjuncts.head.path ==
      Plus(Alt(List(Label("isL"), Label("dw"), Label("rdfs:subClassOf"), Label("isConnectedTo")))))
  }

  test("alternation of complex paths (paper's Q10)") {
    val q = UcrpqParser.parse("?area <- wce -type/(IsL+/dw dw) ?area")
    assert(q.conjuncts.head.left == QConst("wce"))
    assert(q.conjuncts.head.path == Concat(List(Inv("type"),
      Alt(List(Concat(List(Plus(Label("IsL")), Label("dw"))), Label("dw"))))))
  }

  test("multiple conjuncts (paper's Q14)") {
    val q = UcrpqParser.parse("?a,?b,?c <- ?a wasBornIn/IsL+ ?b, ?b isConnectedTo+ ?c")
    assert(q.heads == List("a", "b", "c"))
    assert(q.conjuncts.size == 2)
    assert(q.conjuncts(1) == Conjunct(QVar("b"), Plus(Label("isConnectedTo")), QVar("c")))
  }

  test("nested plus inside alternation (paper's Q17)") {
    val q = UcrpqParser.parse("?a <- ?a IsL+/(isConnectedTo dw)+ Japan")
    assert(q.conjuncts.head.path == Concat(List(Plus(Label("IsL")),
      Plus(Alt(List(Label("isConnectedTo"), Label("dw")))))))
  }

  test("constant on left with inverse path (paper's Q24)") {
    val q = UcrpqParser.parse("?x <- Jay_Kappraff (livesIn/isL/-livesIn)+ ?x")
    assert(q.conjuncts.head.left == QConst("Jay_Kappraff"))
    assert(q.conjuncts.head.path ==
      Plus(Concat(List(Label("livesIn"), Label("isL"), Inv("livesIn")))))
  }

  test("rejects malformed input") {
    assertThrows[ParseError](UcrpqParser.parse("?x ?y <- ?x a ?y")) // missing comma
    assertThrows[ParseError](UcrpqParser.parse("?x <- ?x a"))       // missing endpoint
    assertThrows[ParseError](UcrpqParser.parse("?x <- ?x (a ?y"))   // unclosed paren
    assertThrows[ParseError](UcrpqParser.parse("<- ?x a ?y"))       // no heads
    assertThrows[ParseError](UcrpqParser.parse("?x <- ?x a+ ?y extra tokens"))
  }

  test("identifiers may contain digits, underscores and colons") {
    val q = UcrpqParser.parse("?x <- ?x pred_2:sub+ C_9")
    assert(q.conjuncts.head.path == Plus(Label("pred_2:sub")))
    assert(q.conjuncts.head.right == QConst("C_9"))
  }
}
