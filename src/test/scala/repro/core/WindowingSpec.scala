package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable
import scala.util.Random

/** Unit tests of the frame-based two-stage windowing machinery, checked
  * against naive per-window recomputation.
  */
class WindowingSpec extends AnyFunSuite {

  test("frameEnd is the exclusive slide-aligned upper bound") {
    assert(Windowing.frameEnd(0, 10) == 10)
    assert(Windowing.frameEnd(9, 10) == 10)
    assert(Windowing.frameEnd(10, 10) == 20)
    assert(Windowing.frameEnd(15, 10) == 20)
  }

  test("windowEnds lists exactly size/slide windows") {
    val wd = WindowDef(100, 20)
    val ws = Windowing.windowEnds(37, wd)
    assert(ws.size == 5)
    assert(ws == Seq(40, 60, 80, 100, 120))
    ws.foreach(we => assert(37 >= we - wd.sizeMs && 37 < we))
  }

  test("WindowDef validates size multiple of slide") {
    intercept[IllegalArgumentException](WindowDef(100, 30))
    intercept[IllegalArgumentException](WindowDef(0, 10))
  }

  test("tumbling window (slide == size) assigns each ts to exactly one window") {
    val wd = WindowDef(50, 50)
    (0L until 500L).foreach { ts =>
      assert(Windowing.windowEnds(ts, wd) == Seq(Windowing.frameEnd(ts, 50)))
    }
  }

  /** Drives accumulate→combine directly with a single-sink outbox. */
  private def runWindowPair(
      items: Seq[(Any, Long)],
      wd: WindowDef,
      aggrOp: AggregateOperation[LongAcc, Long],
      watermarks: Seq[Long]
  ): Vector[KeyedWindowResult[Any, Long]] = {
    val accQ  = new SpscQueue(1 << 20)
    val outQ  = new SpscQueue(1 << 20)
    val accOut = new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(accQ)), RoutingPolicy.RoundRobin)))
    val combOut = new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(outQ)), RoutingPolicy.RoundRobin)))
    val acc  = new AccumulateByFrameP[LongAcc](v => v, aggrOp, wd.slideMs)
    val comb = new CombineFramesP[LongAcc, Long](aggrOp, wd)
    val inbox = new Inbox

    def feedCombine(): Unit = {
      var x = accQ.poll()
      while (x != null) {
        x match {
          case d: DataItem => inbox.add(d); comb.process(0, inbox, combOut)
          case _           => ()
        }
        x = accQ.poll()
      }
    }

    val sortedItems = items.sortBy(_._2)
    var wmIdx       = 0
    for ((v, ts) <- sortedItems) {
      while (wmIdx < watermarks.size && watermarks(wmIdx) <= ts) {
        val wm = Watermark(watermarks(wmIdx))
        assert(acc.tryProcessWatermark(wm, accOut))
        feedCombine()
        assert(comb.tryProcessWatermark(wm, combOut))
        wmIdx += 1
      }
      inbox.add(DataItem(v, ts))
      acc.process(0, inbox, accOut)
    }
    assert(acc.complete(accOut))
    feedCombine()
    assert(comb.complete(combOut))

    val out = Vector.newBuilder[KeyedWindowResult[Any, Long]]
    var x   = outQ.poll()
    while (x != null) {
      x match {
        case DataItem(r: KeyedWindowResult[_, _], _) =>
          out += r.asInstanceOf[KeyedWindowResult[Any, Long]]
        case _ => ()
      }
      x = outQ.poll()
    }
    out.result()
  }

  private def naiveCounts(items: Seq[(Any, Long)], wd: WindowDef): Map[(Any, Long), Long] =
    (for { (v, ts) <- items; we <- Windowing.windowEnds(ts, wd) } yield (v, we))
      .groupBy(identity)
      .map { case (kwe, xs) => kwe -> xs.size.toLong }

  test("accumulate+combine (deduct path) equals naive recomputation") {
    val rnd   = new Random(3)
    val wd    = WindowDef(80, 20)
    val items = (0 until 5000).map(_ => (("k" + rnd.nextInt(6)): Any, rnd.nextLong(1000)))
    val wms   = (0L to 1100L by 40L).toVector
    val got = runWindowPair(items, wd, AggregateOperations.counting, wms)
      .map(r => (r.key, r.windowEnd) -> r.result)
      .toMap
    assert(got == naiveCounts(items, wd))
  }

  test("results are identical with and without watermarks (completion flush)") {
    val rnd   = new Random(9)
    val wd    = WindowDef(60, 30)
    val items = (0 until 2000).map(_ => (("k" + rnd.nextInt(4)): Any, rnd.nextLong(500)))
    val withWms = runWindowPair(items, wd, AggregateOperations.counting, (0L to 600L by 30L).toVector)
      .map(r => (r.key, r.windowEnd) -> r.result).toMap
    val noWms = runWindowPair(items, wd, AggregateOperations.counting, Vector.empty)
      .map(r => (r.key, r.windowEnd) -> r.result).toMap
    assert(withWms == noWms)
    assert(noWms == naiveCounts(items, wd))
  }

  test("no result is emitted twice for the same (key, window)") {
    val rnd   = new Random(5)
    val wd    = WindowDef(40, 10)
    val items = (0 until 3000).map(_ => (("k" + rnd.nextInt(10)): Any, rnd.nextLong(700)))
    val out   = runWindowPair(items, wd, AggregateOperations.counting, (0L to 800L by 10L).toVector)
    val kw    = out.map(r => (r.key, r.windowEnd))
    assert(kw.distinct.size == kw.size)
  }

  test("summingLong with deduct equals naive sums") {
    val rnd   = new Random(17)
    val wd    = WindowDef(100, 25)
    val items = (0 until 4000).map(i => ((i % 5).toLong: Any, rnd.nextLong(900)))
    val op    = AggregateOperations.summingLong(v => v.asInstanceOf[Long])
    val got = runWindowPair(items, wd, op, (0L to 1000L by 25L).toVector)
      .map(r => (r.key, r.windowEnd) -> r.result).toMap
    val expected = (for { (v, ts) <- items; we <- Windowing.windowEnds(ts, wd) } yield ((v, we), v.asInstanceOf[Long]))
      .groupBy(_._1).map { case (kwe, xs) => kwe -> xs.map(_._2).sum }
    assert(got == expected)
  }

  test("averagingDouble deduct path stays numerically consistent") {
    val op  = AggregateOperations.averagingDouble(v => v.asInstanceOf[Double])
    val a   = op.create(); val b = op.create()
    op.accumulate(a, 1.0); op.accumulate(a, 3.0)
    op.accumulate(b, 5.0)
    op.combine(a, b)
    assert(op.finish(op.copyAcc(a)) == 3.0)
    op.deduct.get(a, b)
    assert(op.finish(op.copyAcc(a)) == 2.0)
  }

  test("counting deduct reverses combine") {
    val op = AggregateOperations.counting
    val a  = op.create(); val b = op.create()
    (1 to 5).foreach(_ => op.accumulate(a, ()))
    (1 to 3).foreach(_ => op.accumulate(b, ()))
    op.combine(a, b); assert(op.finish(op.copyAcc(a)) == 8)
    op.deduct.get(a, b); assert(op.finish(op.copyAcc(a)) == 5)
  }

  test("copyAcc isolates snapshots from live mutation") {
    val op   = AggregateOperations.counting
    val a    = op.create()
    op.accumulate(a, ())
    val copy = op.copyAcc(a)
    op.accumulate(a, ())
    assert(op.finish(copy) == 1)
    assert(op.finish(a) == 2)
  }

  test("toList has no deduct (recombine path is selected)") {
    assert(AggregateOperations.toList.deduct.isEmpty)
    assert(AggregateOperations.counting.deduct.isDefined)
  }

  test("WindowEndAggregateP groups by window end and emits on watermark") {
    val outQ   = new SpscQueue(1024)
    val outbox = new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(outQ)), RoutingPolicy.RoundRobin)))
    val p = new WindowEndAggregateP((we, vs) => Iterator.single((we, vs.size)))
    val inbox = new Inbox
    inbox.add(DataItem(KeyedWindowResult("a", 100L, 1L), 100))
    inbox.add(DataItem(KeyedWindowResult("b", 100L, 2L), 100))
    inbox.add(DataItem(KeyedWindowResult("a", 200L, 3L), 200))
    p.process(0, inbox, outbox)
    assert(p.tryProcessWatermark(Watermark(100), outbox))
    var got = Vector.empty[Any]
    var x   = outQ.poll()
    while (x != null) { got :+= x.asInstanceOf[DataItem].value; x = outQ.poll() }
    assert(got == Vector((100L, 2)))
    assert(p.complete(outbox))
    got = Vector.empty
    x = outQ.poll()
    while (x != null) { got :+= x.asInstanceOf[DataItem].value; x = outQ.poll() }
    assert(got == Vector((200L, 1)))
  }
}
