package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Partition-count policy: serial runs must really be serial. */
class ParSpec extends AnyFunSuite {

  test("par=1 yields exactly one partition regardless of work") {
    assert(Par.parts(1000000, 1) === 1)
    assert(Par.parts(1, 1) === 1)
  }

  test("par=2 yields at most two partitions") {
    assert(Par.parts(1000000, 2) === 2)
    assert(Par.parts(1, 2) === 1)
  }

  test("larger parallelism oversubscribes 4x but never exceeds work") {
    assert(Par.parts(1000000, 16) === 64)
    assert(Par.parts(10, 16) === 10)
    assert(Par.parts(0, 16) === 1)
  }
}
