package repro.props

import org.scalacheck.{Gen, Prop, Properties}
import repro.dataflow._
import repro.queries.PassThrough

/** ScalaCheck properties of graph routing and the event queue. */
object GraphProps extends Properties("Graph") {

  private def lin(p: Int) = Graph(
    Seq(OperatorSpec("a", () => new PassThrough, stateful = false, isSource = true),
      OperatorSpec("b", () => new PassThrough, stateful = true)),
    Seq(Edge("a", "b", HashPart, key = _.asInstanceOf[Long])), p)

  property("hash routing is total and stable") =
    Prop.forAll(Gen.choose(1, 16), Gen.choose(Long.MinValue, Long.MaxValue)) { (p, k) =>
      val g = lin(p)
      val r = g.route(g.edges.head, 0, k)
      r.size == 1 && r.head >= 0 && r.head < p && r == g.route(g.edges.head, p - 1, k)
    }

  property("hash routing spreads keys across instances") =
    Prop.forAll(Gen.choose(4, 12)) { p =>
      val g = lin(p)
      val targets = (1L to 500L).map(k => g.route(g.edges.head, 0, k).head).toSet
      targets.size == p
    }

  property("channels of an edge connect exactly the edge's endpoints") =
    Prop.forAll(Gen.choose(1, 8)) { p =>
      val g = lin(p)
      val chans = g.channelsOf(g.edges.head)
      chans.forall(c => c.from.op == "a" && c.to.op == "b") && chans.size == p * p
    }

  property("event queue pops in nondecreasing time order") =
    Prop.forAll(Gen.listOf(Gen.choose(0L, 10000L))) { times =>
      val q = new EventQueue
      times.foreach(t => q.schedule(t, InjectFailure))
      val popped = List.fill(times.size)(q.pop()._1)
      popped == popped.sorted
    }
}
