package repro.pregel

import repro.SparkSpec

class PregelRuntimeSpec extends SparkSpec {

  test("a program with no messages terminates after one superstep") {
    val vs = spark.sparkContext.parallelize((1L to 10L).map(i => (i, i)), 2)
    val (out, stats) = PregelRuntime.run[Long, Long](vs, (ctx, id, v, msgs) => v)
    assert(out.collect().toMap == (1L to 10L).map(i => i -> i).toMap)
    assert(stats.supersteps == 1)
    assert(stats.messages == 0)
  }

  test("messages are delivered to arbitrary vertex IDs (not only edges)") {
    // every vertex sends its id to vertex 1 at superstep 0; vertex 1 sums
    val vs = spark.sparkContext.parallelize((1L to 20L).map(i => (i, 0L)), 4)
    val (out, stats) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => {
        if (ctx.superstep == 0) { ctx.send(1L, id); v }
        else v + msgs.sum
      })
    assert(out.collect().toMap.apply(1L) == (1L to 20L).sum)
    assert(stats.messages == 20)
    assert(stats.supersteps == 2)
  }

  test("halted vertices are reactivated by incoming messages") {
    // a chain relay: vertex i forwards a token to i+1; all halt in between
    val n = 6L
    val vs = spark.sparkContext.parallelize((1L to n).map(i => (i, false)), 2)
    val (out, stats) = PregelRuntime.run[Boolean, Unit](vs,
      (ctx, id, v, msgs) => {
        if (ctx.superstep == 0 && id == 1L) { ctx.send(2L, ()); true }
        else if (msgs.nonEmpty) { if (id < n) ctx.send(id + 1, ()); true }
        else v
      })
    assert(out.collect().forall(_._2))
    assert(stats.supersteps == n.toInt)
    assert(stats.messages == n - 1)
  }

  test("message combiner reduces inbox to a single message") {
    val vs = spark.sparkContext.parallelize((1L to 10L).map(i => (i, -1L)), 2)
    val (out, _) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => {
        if (ctx.superstep == 0) { ctx.send(3L, id); v }
        else if (msgs.nonEmpty) { assert(msgs.size == 1); msgs.head }
        else v
      },
      combiner = Some(math.max))
    assert(out.collect().toMap.apply(3L) == 10L)
  }

  test("aggregator sums contributions and is visible next superstep") {
    val vs = spark.sparkContext.parallelize((1L to 5L).map(i => (i, 0L)), 2)
    val (out, _) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => {
        if (ctx.superstep == 0) { ctx.aggValue = id; ctx.send(id, 0L); v }
        else ctx.agg // must see 1+2+3+4+5
      })
    assert(out.collect().forall(_._2 == 15L))
  }

  test("stopWhen halts the run early") {
    val vs = spark.sparkContext.parallelize(Seq((1L, 0L)), 1)
    val (out, stats) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => { ctx.send(id, 0L); ctx.remainActive(); v + 1 },
      stopWhen = info => info.superstep >= 5)
    assert(stats.supersteps == 5)
    assert(out.collect().head._2 == 5L)
  }

  test("maxSupersteps guards against non-termination") {
    val vs = spark.sparkContext.parallelize(Seq((1L, 0L)), 1)
    intercept[IllegalArgumentException] {
      PregelRuntime.run[Long, Long](vs,
        (ctx, id, v, msgs) => { ctx.send(id, 0L); v },
        maxSupersteps = 10)
    }
  }

  test("messages to unknown vertex IDs are dropped") {
    val vs = spark.sparkContext.parallelize(Seq((1L, 0L)), 1)
    val (out, stats) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => { if (ctx.superstep == 0) ctx.send(999L, 1L); v })
    assert(stats.messages == 1)
    assert(out.count() == 1)
  }

  test("paper Fig 1: list-ranking sum via request-respond pointer jumping") {
    // linked list v1 <- v2 <- ... <- v5, val = 1 each; expect sum(vi) = i
    import PregelRuntimeSpec.{M, S}
    val init = (1L to 5L).map(i => (i, S(1, 1, i - 1)))
    val vs = spark.sparkContext.parallelize(init, 2)
    val (out, stats) = PregelRuntime.run[S, M](vs,
      (ctx, id, v, msgs) => {
        if (ctx.superstep % 2 == 0) {
          var s = v
          msgs.foreach { m => if (m.kind == 1) s = s.copy(sum = s.sum + m.sum, pred = m.pred) }
          if (s.pred != 0L) { ctx.send(s.pred, M(0, id, 0, 0)); ctx.remainActive() }
          s
        } else {
          msgs.foreach(m => if (m.kind == 0) ctx.send(m.from, M(1, id, v.sum, v.pred)))
          v
        }
      })
    val sums = out.collect().toMap
    for (i <- 1L to 5L) assert(sums(i).sum == i, s"vertex $i")
    // log-round bound: ceil(log2 5) = 3 rounds of 2 supersteps (+ final check)
    assert(stats.supersteps <= 8)
  }

  test("long chains do not overflow lineage (localCheckpoint kicks in)") {
    val vs = spark.sparkContext.parallelize(Seq((1L, 0L), (2L, 0L)), 1)
    val (out, stats) = PregelRuntime.run[Long, Long](vs,
      (ctx, id, v, msgs) => {
        if (v < 40) { ctx.send(3L - id, v + 1); v + 1 } else v
      },
      checkpointEvery = 5)
    assert(stats.supersteps >= 40)
    assert(out.collect().forall(_._2 >= 40L))
  }
}

object PregelRuntimeSpec {
  /** List-ranking toy state/messages (top-level: Spark-serializable). */
  final case class S(value: Long, sum: Long, pred: Long) // pred 0 = null
  final case class M(kind: Int, from: Long, sum: Long, pred: Long)
}
