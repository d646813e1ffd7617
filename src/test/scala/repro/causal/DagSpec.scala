package repro.causal

import org.scalatest.funsuite.AnyFunSuite

class DagSpec extends AnyFunSuite {

  // Fig. 2-style DAG: Z → T ← W, T → C, D → C (D is a parent of a child)
  private val fig2 = Dag.fromEdges(
    "Z" -> "T", "W" -> "T", "T" -> "C", "D" -> "C", "T" -> "Y")

  test("parents / children / neighbors") {
    assert(fig2.parents("T") == Set("Z", "W"))
    assert(fig2.children("T") == Set("C", "Y"))
    assert(fig2.neighbors("C") == Set("T", "D"))
  }

  test("markov boundary = parents ∪ children ∪ spouses (Prop. 2.5)") {
    assert(fig2.markovBoundary("T") == Set("Z", "W", "C", "Y", "D"))
    assert(fig2.markovBoundary("Z") == Set("T", "W")) // W is a spouse via T
    assert(fig2.markovBoundary("D") == Set("C", "T"))
  }

  test("topological order puts parents first") {
    val topo = fig2.topological
    assert(topo.indexOf("Z") < topo.indexOf("T"))
    assert(topo.indexOf("W") < topo.indexOf("T"))
    assert(topo.indexOf("T") < topo.indexOf("C"))
    assert(topo.indexOf("D") < topo.indexOf("C"))
  }

  test("cycle detection") {
    val cyclic = Dag(Vector("A", "B", "C"), Set("A" -> "B", "B" -> "C", "C" -> "A"))
    assert(!cyclic.isAcyclic)
    assert(fig2.isAcyclic)
  }

  test("descendants") {
    assert(fig2.descendants("Z") == Set("T", "C", "Y"))
    assert(fig2.descendants("C") == Set())
  }

  test("d-separation: parents of a collider are marginally independent") {
    assert(fig2.dSeparated("Z", "W", Set.empty))
  }
  test("d-separation: conditioning on the collider opens the path") {
    assert(!fig2.dSeparated("Z", "W", Set("T")))
  }
  test("d-separation: conditioning on a collider's descendant opens the path") {
    assert(!fig2.dSeparated("Z", "W", Set("Y"))) // Y is a child of T
  }
  test("d-separation: chain blocked by the middle node") {
    val chain = Dag.fromEdges("A" -> "B", "B" -> "C")
    assert(!chain.dSeparated("A", "C", Set.empty))
    assert(chain.dSeparated("A", "C", Set("B")))
  }
  test("d-separation: fork blocked by the common cause") {
    val fork = Dag.fromEdges("B" -> "A", "B" -> "C")
    assert(!fork.dSeparated("A", "C", Set.empty))
    assert(fork.dSeparated("A", "C", Set("B")))
  }
  test("d-separation on the LUCAS graph (Ex. 10.1)") {
    import repro.data.Datasets.cancerDag
    // Peer_Pressure ⊥ Anxiety, but NOT given the collider Smoking
    assert(cancerDag.dSeparated("Peer_Pressure", "Anxiety", Set.empty))
    assert(!cancerDag.dSeparated("Peer_Pressure", "Anxiety", Set("Smoking")))
    // Born_an_Even_Day is isolated
    assert(cancerDag.dSeparated("Born_an_Even_Day", "Lung_Cancer", Set.empty))
    // Lung_Cancer ⊥ Car_Accident given both mediators' parents
    assert(cancerDag.dSeparated("Lung_Cancer", "Car_Accident",
                                Set("Fatigue", "Attention_Disorder")))
    assert(!cancerDag.dSeparated("Lung_Cancer", "Car_Accident", Set.empty))
  }

  test("RandomDag generates acyclic graphs of the right size") {
    for (seed <- 1 to 10; n <- Seq(8, 16, 32)) {
      val d = RandomDag.generate(n, expectedParents = 1.5, seed = seed)
      assert(d.nodes.size == n)
      assert(d.isAcyclic)
      assert(d.nodes.forall(x => d.parents(x).size <= 3))
    }
  }
  test("RandomDag is deterministic in the seed") {
    val a = RandomDag.generate(16, 1.5, seed = 99)
    val b = RandomDag.generate(16, 1.5, seed = 99)
    assert(a.edges == b.edges)
  }
  test("RandomDag edge density scales with expectedParents") {
    val sparse = (1 to 20).map(s => RandomDag.generate(16, 0.5, s).edges.size).sum
    val dense  = (1 to 20).map(s => RandomDag.generate(16, 2.5, s).edges.size).sum
    assert(dense > sparse)
  }
}
