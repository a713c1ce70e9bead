package repro.ivm

import scala.util.Random
import repro.{SparkSpec, TestGraphs}
import repro.core.QueryPipeline
import repro.eval.BatchEvaluator
import repro.graph._

/** Seeded randomized update streams against random reply forests: after
  * every batch the maintained view must equal full recomputation. This is
  * the broad-coverage safety net behind the hand-picked cases.
  */
class RandomizedStreamSpec extends SparkSpec {

  private val langs = Seq("en", "de", "fr")

  private def randomGraph(rnd: Random, nPosts: Int, nComms: Int): (PropertyGraph, Seq[Long]) = {
    val posts = (1 to nPosts).map(i =>
      (i.toLong, "Post", Map("lang" -> langs(rnd.nextInt(langs.size)))))
    val comms = (1 to nComms).map(i =>
      (100L + i, "Comm", Map("lang" -> langs(rnd.nextInt(langs.size)))))
    val edges = (1 to nComms).map { i =>
      val child = 100L + i
      val parent =
        if (i == 1 || rnd.nextDouble() < 0.4) rnd.nextInt(nPosts) + 1L
        else 100L + (rnd.nextInt(i - 1) + 1)
      (1000L + i, child, parent, "REPLY", Map.empty[String, String])
    }
    (PropertyGraph.fromElements(spark, posts ++ comms, edges),
      (posts ++ comms).map(_._1))
  }

  private def randomOps(rnd: Random, live: scala.collection.mutable.Set[Long],
      nextId: () => Long, nextEdge: () => Long, n: Int): Seq[UpdateOp] =
    (1 to n).flatMap { _ =>
      rnd.nextInt(4) match {
        case 0 if live.nonEmpty => // new comment under a random live vertex
          val parent = live.toSeq(rnd.nextInt(live.size))
          val id = nextId(); live += id
          Seq(AddVertex(id, "Comm", Map("lang" -> langs(rnd.nextInt(langs.size)))),
            AddEdge(nextEdge(), id, parent, "REPLY", Map.empty))
        case 1 if live.size > 3 => // remove a random vertex (cascades)
          val id = live.toSeq(rnd.nextInt(live.size)); live -= id
          Seq(RemoveVertex(id))
        case 2 if live.nonEmpty => // flip a language
          Seq(SetVertexProp(live.toSeq(rnd.nextInt(live.size)), "lang",
            langs(rnd.nextInt(langs.size))))
        case _ if live.size >= 2 => // random extra REPLY edge (may create DAG shapes)
          val s = live.toSeq
          Seq(AddEdge(nextEdge(), s(rnd.nextInt(s.size)), s(rnd.nextInt(s.size)), "REPLY", Map.empty))
        case _ => Seq.empty
      }
    }

  private def runStream(seed: Long, cypher: String, batches: Int, opsPerBatch: Int): Unit = {
    val rnd = new Random(seed)
    val (g, ids) = randomGraph(rnd, nPosts = 3, nComms = 12)
    val store = new GraphStore(spark, g)
    val live = scala.collection.mutable.Set.from(ids)
    var vid = 500L
    var eid = 5000L
    val flat = QueryPipeline.compile(cypher)
    val engine = IncrementalEngine(flat, store.current)
    (1 to batches).foreach { i =>
      val ops = randomOps(rnd, live, () => { vid += 1; vid }, () => { eid += 1; eid }, opsPerBatch)
      engine.applyOps(store, ops)
      try {
        TestGraphs.assertCountedEqualsPlain(engine.view, BatchEvaluator.eval(flat, store.current))
        TestGraphs.assertValidState(engine.view)
      } catch {
        case e: AssertionError =>
          throw new AssertionError(s"seed=$seed batch=$i ops=$ops: ${e.getMessage}", e)
      }
    }
  }

  private val closureQuery =
    "MATCH t = (p:Post)<-[:REPLY*1..6]-(c:Comm) WHERE c.lang = p.lang RETURN p, c, t"
  private val flatQuery =
    "MATCH (c:Comm)-[:REPLY]->(p:Post) WHERE c.lang = p.lang RETURN c, p"

  for (seed <- 1L to 5L) {
    test(s"random stream seed=$seed: closure query stays consistent") {
      runStream(seed, closureQuery, batches = 4, opsPerBatch = 3)
    }
  }

  for (seed <- 6L to 9L) {
    test(s"random stream seed=$seed: flat query stays consistent") {
      runStream(seed, flatQuery, batches = 4, opsPerBatch = 4)
    }
  }

  test("random stream with larger batches (seed=42)") {
    runStream(42L, closureQuery, batches = 2, opsPerBatch = 10)
  }
}
