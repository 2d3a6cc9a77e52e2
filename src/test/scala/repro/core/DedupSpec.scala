package repro.core

import org.scalatest.funsuite.AnyFunSuite
import TokType._
import UniFi.{ConstStr, Extract, Plan}

/** Appendix B: equivalent-plan detection. */
class DedupSpec extends AnyFunSuite {

  // source <D>2 '/' <D>2 — the paper's own example
  private val src = Pattern.of(Token(D, 2), Token.lit("/"), Token(D, 2))

  test("paper's example: Extract(2) of '/' equals ConstStr('/')") {
    val p1 = Plan(Vector(Extract(3), ConstStr("/"), Extract(1)))
    val p2 = Plan(Vector(Extract(3), Extract(2), Extract(1)))
    assert(Dedup.equivalent(p1, p2, src))
  }

  test("multi-token extract is split before comparison") {
    val p1 = Plan(Vector(Extract(1, 3)))
    val p2 = Plan(Vector(Extract(1), Extract(2), Extract(3)))
    assert(Dedup.equivalent(p1, p2, src))
  }

  test("extract of a constant-valued base token is NOT a ConstStr equivalent") {
    // token 1 is <D>2 (not a literal): its value varies per string
    val p1 = Plan(Vector(Extract(1)))
    val p2 = Plan(Vector(ConstStr("12")))
    assert(!Dedup.equivalent(p1, p2, src))
  }

  test("different lengths after atomization are not equivalent") {
    val p1 = Plan(Vector(Extract(1, 2)))
    val p2 = Plan(Vector(Extract(1)))
    assert(!Dedup.equivalent(p1, p2, src))
  }

  test("different extractions are not equivalent") {
    val p1 = Plan(Vector(Extract(1)))
    val p2 = Plan(Vector(Extract(3)))
    assert(!Dedup.equivalent(p1, p2, src))
  }

  test("dedup keeps the first representative of each class") {
    val a = Plan(Vector(Extract(1, 3)))
    val b = Plan(Vector(Extract(1), Extract(2), Extract(3)))
    val c = Plan(Vector(Extract(1), ConstStr("/"), Extract(3)))
    assert(Dedup.dedup(Seq(a, b, c), src) == Vector(a))
  }

  test("dedup honors maxKeep") {
    val plans = (1 to 3).map(i => Plan(Vector(Extract(i))))
    assert(Dedup.dedup(plans, src, maxKeep = 2).size == 2)
  }

  test("equivalence is symmetric") {
    val p1 = Plan(Vector(ConstStr("/")))
    val p2 = Plan(Vector(Extract(2)))
    assert(Dedup.equivalent(p1, p2, src) && Dedup.equivalent(p2, p1, src))
  }
}
