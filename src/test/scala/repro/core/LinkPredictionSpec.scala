package repro.core

import repro.SparkSpec
import repro.graph.{GraphGen, SparkGraph}

class LinkPredictionSpec extends SparkSpec {

  test("split partitions the edge set exactly") {
    import spark.implicits._
    val g = GraphGen.er(spark, 60, 300, seed = 51)
    val (sparse, removed) = LinkPrediction.split(g, 0.2, seed = 1)
    val all = g.canonicalEdges.as[(Int, Int)].collect().toSet
    val kept = sparse.canonicalEdges.as[(Int, Int)].collect().toSet
    val rem = removed.as[(Int, Int)].collect().toSet
    assert(kept.intersect(rem).isEmpty)
    assert(kept.union(rem) == all)
  }

  test("frac=0 removes nothing; effectiveness well-defined") {
    val g = GraphGen.er(spark, 40, 150, seed = 52)
    val r = LinkPrediction.run(g, frac = 0.0)
    assert(r.removed == 0 && r.hits == 0 && r.effectiveness == 0.0)
  }

  test("on K_n every removed edge is recovered (eff = 1)") {
    // In K12 minus the removed set, candidate non-edges are exactly the
    // removed edges, so prediction must recover all of them.
    val g = GraphGen.complete(spark, 12)
    val r = LinkPrediction.run(g, Similarity.CommonNeighbors, frac = 0.15, seed = 3)
    assert(r.removed > 0)
    assert(r.hits == r.removed)
    assert(r.effectiveness == 1.0)
  }

  test("planted-clique graph: prediction beats random guessing") {
    val g = GraphGen.plantedCliques(spark, n = 150, bgEdges = 120,
                                    cliques = 6, sizes = Seq(10))
    val r = LinkPrediction.run(g, Similarity.Jaccard, frac = 0.1, seed = 4)
    assert(r.removed > 0)
    // Random guessing over all non-adjacent pairs would hit ≈ removed / C(n,2)
    // ≈ 0.5%; clique-structured similarity should far exceed that.
    assert(r.effectiveness > 0.2, s"eff=${r.effectiveness}")
  }

  test("effectiveness bounded in [0, 1] for every measure") {
    val g = GraphGen.er(spark, 80, 500, seed = 55)
    for (m <- Similarity.allMeasures) {
      val r = LinkPrediction.run(g, m, frac = 0.1, seed = 5)
      assert(r.effectiveness >= 0.0 && r.effectiveness <= 1.0, m.name)
    }
  }
}
