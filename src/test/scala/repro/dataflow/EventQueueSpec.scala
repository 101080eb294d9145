package repro.dataflow

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class EventQueueSpec extends AnyFunSuite {

  test("events pop in time order") {
    val q = new EventQueue
    q.schedule(30, Wake(InstanceId("a", 0)))
    q.schedule(10, Wake(InstanceId("b", 0)))
    q.schedule(20, Wake(InstanceId("c", 0)))
    assert(q.pop()._1 == 10)
    assert(q.pop()._1 == 20)
    assert(q.pop()._1 == 30)
  }

  test("ties break by insertion order (deterministic)") {
    val q = new EventQueue
    val ids = (0 until 50).map(i => InstanceId(s"op$i", 0))
    ids.foreach(id => q.schedule(5, Wake(id)))
    val popped = (0 until 50).map(_ => q.pop()._2.asInstanceOf[Wake].id)
    assert(popped == ids)
  }

  test("clear drops everything") {
    val q = new EventQueue
    (1 to 10).foreach(i => q.schedule(i.toLong, InjectFailure))
    q.clear()
    assert(q.isEmpty)
  }

  test("pop sequence is sorted by time for random schedules (100 seeds)") {
    (1 to 100).foreach { seed =>
      val rnd = new Random(seed)
      val q = new EventQueue
      (0 until 200).foreach(_ => q.schedule(rnd.nextInt(1000).toLong, InjectFailure))
      val out = Iterator.continually(if (q.nonEmpty) Some(q.pop()._1) else None)
        .takeWhile(_.isDefined).flatten.toList
      assert(out == out.sorted)
    }
  }

  test("interleaved schedule/pop never goes back in time") {
    val rnd = new Random(1234)
    val q = new EventQueue
    var last = 0L
    (0 until 500).foreach { _ =>
      q.schedule(last + rnd.nextInt(100), InjectFailure)
      if (rnd.nextBoolean() && q.nonEmpty) {
        val (t, _) = q.pop()
        assert(t >= last)
        last = t
      }
    }
  }
}
