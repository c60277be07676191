"""Worker-conflict independence graph, built with Spark DataFrame joins.

Reproduces the paper's Fig 4 gradual (d+1)-NN-bound expansion:

1. rank every (task, slot, worker) triple by travel distance with a window
   function — rank 1 is the lowest-cost worker the task would claim;
2. start every task at bound 1 (its 1-NN circle); any two tasks sharing a
   worker instance within their current bounds get a conflict edge;
3. a node of degree d expands to its (d+1)-NN bound; repeat until no new
   edges appear;
4. connected components of the resulting independence graph are the groups
   that can be optimized in parallel.

Components are computed with union-find on the collected edge list — |T| is
at most a few hundred, so driver-side CC is the right altitude; everything
upstream (the |T|×|W| distance join, ranking, and self-join per round) runs
in Catalyst.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.workloads import Workload


def ranked_candidates(
    spark: SparkSession, wl: Workload, *, top_r: int = 8
) -> DataFrame:
    """Per-(task, slot) worker candidates ranked ascending by travel cost."""
    tasks = spark.createDataFrame(wl.tasks[["task_id", "x", "y"]])
    worker_schema = "worker_id long, slot long, x double, y double"
    workers = spark.createDataFrame(wl.workers, schema=worker_schema)
    joined = tasks.alias("t").crossJoin(
        workers.selectExpr(
            "worker_id", "slot", "x AS wx", "y AS wy"
        ).alias("w")
    )
    dist = F.sqrt(
        (F.col("t.x") - F.col("wx")) ** 2 + (F.col("t.y") - F.col("wy")) ** 2
    )
    win = Window.partitionBy("task_id", "slot").orderBy("dist", "worker_id")
    return (
        joined.select("task_id", "slot", "worker_id", dist.alias("dist"))
        .withColumn("rnk", F.row_number().over(win))
        .filter(F.col("rnk") <= top_r)
    )


def conflict_edges(
    spark: SparkSession,
    ranked: DataFrame,
    n_tasks: int,
    *,
    max_rounds: int = 8,
) -> tuple[set[tuple[int, int]], dict[int, int], int]:
    """Gradual NN-bound expansion.  Returns (edges, final bounds, rounds)."""
    ranked = ranked.cache()
    bounds = {t: 1 for t in range(n_tasks)}
    edges: set[tuple[int, int]] = set()
    rounds = 0
    for _ in range(max_rounds):
        rounds += 1
        bounds_df = spark.createDataFrame(
            pd.DataFrame(
                {"task_id": list(bounds), "bound": list(bounds.values())}
            )
        )
        # bounds_df is |T| rows — broadcast explicitly (the session disables
        # auto-broadcast to keep shuffle paths honest elsewhere).
        cur = ranked.join(F.broadcast(bounds_df), "task_id").filter(
            F.col("rnk") <= F.col("bound")
        )
        a = cur.selectExpr("task_id AS ta", "slot", "worker_id")
        b = cur.selectExpr("task_id AS tb", "slot", "worker_id")
        pairs = (
            a.join(F.broadcast(b), ["slot", "worker_id"])
            .filter(F.col("ta") < F.col("tb"))
            .select("ta", "tb")
            .distinct()
            .toPandas()
        )
        new = {
            (int(r.ta), int(r.tb)) for r in pairs.itertuples(index=False)
        } - edges
        if not new:
            break
        edges |= new
        deg: dict[int, int] = {t: 0 for t in bounds}
        for ta, tb in edges:
            deg[ta] += 1
            deg[tb] += 1
        bounds = {t: d + 1 for t, d in deg.items()}
    ranked.unpersist()
    return edges, bounds, rounds


def connected_components(
    n_tasks: int, edges: set[tuple[int, int]]
) -> pd.DataFrame:
    """Union-find over the conflict edges → ``(task_id, group_id)``."""
    parent = list(range(n_tasks))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for a, b in edges:
        ra, rb = find(a), find(b)
        if ra != rb:
            parent[max(ra, rb)] = min(ra, rb)
    roots = [find(t) for t in range(n_tasks)]
    # Renumber roots densely for stable group ids.
    remap = {r: i for i, r in enumerate(sorted(set(roots)))}
    return pd.DataFrame(
        {"task_id": range(n_tasks), "group_id": [remap[r] for r in roots]}
    )


def build_groups(
    spark: SparkSession, wl: Workload, *, top_r: int = 8
) -> tuple[pd.DataFrame, set[tuple[int, int]], dict]:
    """Full pipeline: ranked join → expansion → components."""
    ranked = ranked_candidates(spark, wl, top_r=top_r)
    edges, bounds, rounds = conflict_edges(spark, ranked, wl.n_tasks)
    groups = connected_components(wl.n_tasks, edges)
    stats = {
        "n_edges": len(edges),
        "n_groups": int(groups["group_id"].nunique()),
        "max_group": int(groups.groupby("group_id").size().max()),
        "expansion_rounds": rounds,
    }
    return groups, edges, stats
