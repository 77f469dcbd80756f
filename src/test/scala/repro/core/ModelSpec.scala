package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Data-model invariants. */
class ModelSpec extends AnyFunSuite {

  test("SlotCandidates requires aligned arrays") {
    intercept[IllegalArgumentException] {
      SlotCandidates(Array(1, 2), Array(0.5))
    }
  }

  test("SlotCandidates costAt returns +inf past the list") {
    val sc = SlotCandidates(Array(1), Array(0.25))
    assert(sc.costAt(0) == 0.25)
    assert(sc.costAt(1).isPosInfinity)
    assert(sc.nonEmpty && !sc.isEmpty)
  }

  test("empty SlotCandidates") {
    val sc = SlotCandidates(Array.empty, Array.empty)
    assert(sc.isEmpty)
    assert(sc.costAt(0).isPosInfinity)
  }

  test("TaskInstance requires one candidate list per slot") {
    intercept[IllegalArgumentException] {
      TaskInstance(Task(0, 0.1, 0.1, 3),
        Array(SlotCandidates(Array(1), Array(1.0))))
    }
  }

  test("TaskInstance cost and fullCost") {
    val inst = TaskInstance(Task(0, 0, 0, 3), Array(
      SlotCandidates(Array(1), Array(0.5)),
      SlotCandidates(Array.empty, Array.empty),
      SlotCandidates(Array(2, 3), Array(0.25, 0.75)),
    ))
    assert(inst.cost(0) == 0.5)
    assert(inst.cost(1).isPosInfinity)
    assert(inst.cost(2) == 0.25)
    assert(math.abs(inst.fullCost - 0.75) < 1e-12)
  }

  test("TcscParams validates k and ts") {
    intercept[IllegalArgumentException](TcscParams(k = 0))
    intercept[IllegalArgumentException](TcscParams(ts = 0))
    assert(TcscParams().k == 3 && TcscParams().ts == 4) // paper defaults
  }

  test("AssignmentResult carries the plan") {
    val r = AssignmentResult(Vector(3, 1), 0.7, 1.2)
    assert(r.executedSlots == Vector(3, 1) && r.totalCost == 0.7 && r.quality == 1.2)
  }
}
