package repro.regexreplace

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Token, Tokenizer, UniFi}
import repro.core.UniFi.{ConstStr, Extract, Plan}
import RegexReplace._

/** The RegexReplace substrate: recipe semantics. */
class RegexReplaceSpec extends AnyFunSuite {

  private val phoneOp = Op(
    Tokenizer.tokenize("734.645.8397"),
    Plan(Vector(ConstStr("("), Extract(1), ConstStr(") "), Extract(3), ConstStr("-"), Extract(5))),
  )

  test("op applies on full match only") {
    assert(phoneOp("201.555.0100").contains("(201) 555-0100"))
    assert(phoneOp("x201.555.0100").isEmpty)
  }

  test("recipe: first match wins") {
    val identity = Op(Tokenizer.tokenize("734.645.8397"), Plan(Vector(Extract(1, 5))))
    val r = Recipe(Vector(identity, phoneOp))
    assert(r("201.555.0100") == "201.555.0100")
  }

  test("recipe: unmatched strings pass through") {
    assert(Recipe(Vector(phoneOp))("N/A") == "N/A")
  }

  test("prepend puts the op in front") {
    val exact = Op(repro.core.Pattern.of(Token.lit("201.555.0100")),
                   Plan(Vector(ConstStr("special"))))
    val r = Recipe(Vector(phoneOp)).prepend(exact)
    assert(r("201.555.0100") == "special")
    assert(r("202.555.0100") == "(202) 555-0100")
  }

  test("append preserves earlier ops' priority") {
    val r = empty.append(phoneOp).append(
      Op(Tokenizer.tokenize("1.2.3"), Plan(Vector(Extract(1)))))
    assert(r.size == 2)
    assert(r("9.8.7") == "9")
  }

  test("empty recipe is the identity") {
    assert(empty("anything") == "anything")
  }

  test("ops render to user-facing Replace form via RegexExplain") {
    val rep = repro.core.RegexExplain.explain(UniFi.Branch(phoneOp.pattern, phoneOp.plan))
    assert(rep.javaReplacement == "($1) $2-$3")
    assert(rep.applyJava("201.555.0100") == phoneOp("201.555.0100"))
  }
}
