package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{CapParams, SignPolicy}

class JobUtilSpec extends AnyFunSuite {

  test("parse reads --key value pairs") {
    val a = JobUtil.parse(Array("--dataset", "china6", "--sf", "0.1", "--psi", "25"))
    assert(a.str("dataset", "x") == "china6")
    assert(a.dbl("sf", 1.0) == 0.1)
    assert(a.int("psi", 10) == 25)
  }

  test("missing keys fall back to defaults") {
    val a = JobUtil.parse(Array.empty)
    assert(a.str("dataset", "santander") == "santander")
    assert(a.dbl("sf", 1.0) == 1.0)
    assert(a.bool("flag", true))
  }

  test("capParams overrides only the provided parameters") {
    val a = JobUtil.parse(Array("--epsilon", "2.5", "--mu", "4", "--sign", "any"))
    val p = a.capParams(CapParams(psi = 50))
    assert(p.epsilon == 2.5 && p.mu == 4 && p.psi == 50)
    assert(p.signPolicy == SignPolicy.AnySign)
    assert(p.etaKm == CapParams().etaKm)
  }

  test("boolean flags parse") {
    val a = JobUtil.parse(Array("--allow-single-attr", "true"))
    assert(a.capParams().allowSingleAttribute)
  }

  test("non --key tokens are ignored rather than crashing") {
    val a = JobUtil.parse(Array("positional", "junk", "--sf", "0.5"))
    assert(a.dbl("sf", 1.0) == 0.5)
  }
}
