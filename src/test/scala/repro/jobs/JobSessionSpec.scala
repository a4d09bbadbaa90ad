package repro.jobs

import org.scalatest.funsuite.AnyFunSuite

class JobSessionSpec extends AnyFunSuite {

  test("--scale parses a double") {
    assert(JobSession.scale(Array("--scale", "2.5")) == 2.5)
  }

  test("scale defaults to 1.0 without the flag") {
    assert(JobSession.scale(Array.empty) == 1.0)
    assert(JobSession.scale(Array("--other", "3")) == 1.0)
  }

  test("scale finds the flag among other args") {
    assert(JobSession.scale(Array("--foo", "x", "--scale", "0.5")) == 0.5)
  }
}
