package repro.dataflow

import org.scalatest.funsuite.AnyFunSuite
import repro.queries._

class GraphSpec extends AnyFunSuite {
  private def pass = () => new PassThrough

  private def lin(parallelism: Int) = Graph(
    Seq(
      OperatorSpec("a", pass, stateful = false, isSource = true),
      OperatorSpec("b", pass, stateful = true),
      OperatorSpec("c", pass, stateful = false, isSink = true),
    ),
    Seq(Edge("a", "b", HashPart, key = _.asInstanceOf[Long]), Edge("b", "c", ForwardPart)),
    parallelism)

  test("instances enumerate ops x parallelism") {
    assert(lin(3).instances.size == 9)
  }

  test("hash edges create full bipartite channels, forward edges one-to-one") {
    val g = lin(3)
    assert(g.channelsOf(g.edges.head).size == 9)
    assert(g.channelsOf(g.edges(1)).size == 3)
  }

  test("inChannels / outChannels are consistent") {
    val g = lin(2)
    val b0 = InstanceId("b", 0)
    assert(g.inChannels(b0).map(_.from.op).toSet == Set("a"))
    assert(g.inChannels(b0).size == 2)
    assert(g.outChannels(b0) == Seq(ChannelId(b0, InstanceId("c", 0))))
  }

  test("hash routing is deterministic and in range") {
    val g = lin(7)
    val e = g.edges.head
    (1L to 100L).foreach { k =>
      val r1 = g.route(e, 0, k)
      assert(r1 == g.route(e, 3, k), "hash routing must not depend on sender")
      assert(r1.size == 1 && r1.head >= 0 && r1.head < 7)
    }
  }

  test("broadcast routes to every instance") {
    val g = Graph(lin(4).ops, Seq(Edge("a", "b", BroadcastPart)), 4)
    assert(g.route(g.edges.head, 1, 42L) == (0 until 4))
  }

  test("acyclic graph detected as such") {
    assert(!lin(2).isCyclic)
  }

  test("cyclic graph detected") {
    val g = Graph(
      Seq(OperatorSpec("a", pass, stateful = false, isSource = true),
        OperatorSpec("b", pass, stateful = true),
        OperatorSpec("c", pass, stateful = false)),
      Seq(Edge("a", "b", ForwardPart), Edge("b", "c", ForwardPart),
        Edge("c", "b", ForwardPart)),
      2)
    assert(g.isCyclic)
  }

  test("reachability query graph is cyclic; NexMark graphs are not") {
    val reach = Reachability(ReachConfig(100, 10, 1_000_000L))
    assert(reach.graph(2).isCyclic)
    Seq(Q1, Q3, Q8(), Q12()).foreach(q => assert(!q.graph(2).isCyclic, q.name))
  }

  test("duplicate op names rejected") {
    intercept[IllegalArgumentException] {
      Graph(Seq(OperatorSpec("a", pass, stateful = false),
        OperatorSpec("a", pass, stateful = false)), Nil, 1)
    }
  }

  test("edges to unknown ops rejected") {
    intercept[IllegalArgumentException] {
      Graph(Seq(OperatorSpec("a", pass, stateful = false)),
        Seq(Edge("a", "zz", ForwardPart)), 1)
    }
  }
}
