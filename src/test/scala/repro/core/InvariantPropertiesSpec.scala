package repro.core

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import repro.SparkSpec
import repro.maxflow.TimeExpanded

/** Randomised cross-method invariants (the correctness backbone of the
  * reproduction): on arbitrary small interaction DAGs (and cyclic cycle-seed
  * shapes),
  *
  *   greedy <= max flow,
  *   LP == time-expanded Dinic,
  *   Pre == PreSim == LP,
  *   preprocessing and simplification preserve the max flow,
  *   Lemma 2 graphs: greedy == max flow.
  *
  * (Driven by raw ScalaCheck generators — the scalatest-scalacheck bridge is
  * not among the offline dependencies, so sampling is explicit.)
  */
class InvariantPropertiesSpec extends SparkSpec {
  private val Tol = 1e-6
  private val Cases = 300

  /** Deterministically sample `Cases` graphs from `gen` and assert `p`. */
  private def checkProp(name: String, gen: Gen[FlowGraph])(p: FlowGraph => Boolean): Unit = {
    var seed = Seed(0xC0FFEEL)
    var i    = 0
    var sampled = 0
    while (sampled < Cases && i < Cases * 3) {
      gen.apply(Gen.Parameters.default, seed) match {
        case Some(g) =>
          sampled += 1
          assert(p(g), s"$name failed on sample #$sampled: $g edges=${g.edges}")
        case None =>
      }
      seed = seed.next
      i += 1
    }
    assert(sampled >= Cases / 2, s"$name: generator produced too few samples ($sampled)")
  }

  private def maxFlowRef(g: FlowGraph): Double = TimeExpanded.maxFlow(g)

  test("property: greedy never exceeds the max flow (DAGs)") {
    checkProp("greedy<=max", TestGraphs.genDag()) { g =>
      Greedy.flow(g) <= maxFlowRef(g) + Tol
    }
  }

  test("property: LP equals time-expanded Dinic (DAGs)") {
    checkProp("lp==dinic", TestGraphs.genDag()) { g =>
      math.abs(MaxFlowLP.maxFlow(g) - maxFlowRef(g)) < Tol
    }
  }

  test("property: LP equals time-expanded Dinic (cyclic shapes)") {
    checkProp("lp==dinic/cyclic", TestGraphs.genMaybeCyclic()) { g =>
      math.abs(MaxFlowLP.maxFlow(g) - maxFlowRef(g)) < Tol
    }
  }

  test("property: preprocessing preserves the max flow") {
    checkProp("preprocess", TestGraphs.genDag()) { g =>
      val pr    = Preprocess.run(g)
      val after = if (pr.zeroFlow) 0.0 else maxFlowRef(pr.graph)
      math.abs(maxFlowRef(g) - after) < Tol
    }
  }

  test("property: preprocessing preserves the max flow on cyclic shapes") {
    checkProp("preprocess/cyclic", TestGraphs.genMaybeCyclic()) { g =>
      val pr    = Preprocess.run(g)
      val after = if (pr.zeroFlow) 0.0 else maxFlowRef(pr.graph)
      math.abs(maxFlowRef(g) - after) < Tol
    }
  }

  test("property: simplification preserves the max flow") {
    checkProp("simplify", TestGraphs.genDag()) { g =>
      math.abs(maxFlowRef(g) - maxFlowRef(Simplify.run(g).graph)) < Tol
    }
  }

  test("property: Pre and PreSim equal LP") {
    checkProp("pre/presim", TestGraphs.genDag()) { g =>
      val ref = maxFlowRef(g)
      math.abs(FlowPipeline.pre(g).flow - ref) < Tol &&
      math.abs(FlowPipeline.preSim(g).flow - ref) < Tol
    }
  }

  test("property: Pre and PreSim equal the max flow on cyclic shapes") {
    checkProp("pre/presim/cyclic", TestGraphs.genMaybeCyclic()) { g =>
      val ref = maxFlowRef(g)
      math.abs(FlowPipeline.pre(g).flow - ref) < Tol &&
      math.abs(FlowPipeline.preSim(g).flow - ref) < Tol
    }
  }

  test("property: Lemma 2 condition implies greedy == max flow") {
    checkProp("lemma2", TestGraphs.genDag()) { g =>
      !Solubility.solvableByGreedy(g) || math.abs(Greedy.flow(g) - maxFlowRef(g)) < Tol
    }
  }

  test("property: what the buffers hold never exceeds what left the source") {
    checkProp("conservation", TestGraphs.genDag()) { g =>
      val r        = Greedy.run(g)
      val injected = g.interactions.filter(_.src == g.source).map(_.qty).sum
      r.buffers.values.sum <= injected + Tol
    }
  }
}
