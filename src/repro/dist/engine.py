"""HGMatch as a Spark DataFrame dataflow (SCAN -> EXPAND* -> SINK).

Every EXPAND step executes Alg. 4 + Alg. 5 with relational set
operations distributed across executors:

1. *per-constraint candidate vertices* — pure Catalyst higher-order
   functions over the carried ``vsets``/``lsets`` arrays (label check,
   partial-embedding degree via ``size(filter(...))``, non-incident
   exclusion via ``array_contains``) — the set difference/filter of
   Alg. 4 line 5;
2. *posting-list union* — ``explode`` the candidate vertices and join
   the inverted-index relation on ``(sig, v)`` — Alg. 4 line 6;
3. *intersection* — ``groupBy (embedding, candidate) HAVING
   count(DISTINCT constraint) = K`` — Alg. 4 line 7;
4. *validation* — vertex-count check + vertex-profile multiset equality
   against the plan's literal expected profiles (Alg. 5), again as pure
   expressions (``sequence``/``element_at``/``sort_array``).

No Python UDFs anywhere: query-side quantities are literals from the
:class:`~repro.core.plan.CompiledPlan`, so the whole job is one
Catalyst-optimised DAG per step, shuffled across executors.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.order import compute_matching_order
from repro.core.plan import CompiledPlan, PlanStep, compile_plan
from repro.dist.storage import SparkHypergraph, sig_str
from repro.hyper.model import Hypergraph


def _sql_quote(s: str) -> str:
    return s.replace("\\", "\\\\").replace("'", "\\'")


def _expected_profile_strings(step: PlanStep) -> list[str]:
    """Query-side profile multiset as sorted strings 'label|j1,j2'."""
    return sorted(
        f"{label}|{','.join(str(j) for j in positions)}"
        for label, positions in step.expected_profiles
    )


def _scan(sh: SparkHypergraph, step: PlanStep) -> DataFrame:
    """SCAN(phi[0]): all data hyperedges in the partition S(phi[0])."""
    return (
        sh.edges.where(F.col("sig") == sig_str(step.sig))
        .select(
            F.array("eid").alias("emb"),
            F.array("vs").alias("vsets"),
            F.array("ls").alias("lsets"),
        )
    )


def _expand(sh: SparkHypergraph, step: PlanStep, cur: DataFrame) -> DataFrame:
    """EXPAND(phi[i]): extend every partial embedding by one hyperedge."""
    i = step.i
    s = sig_str(step.sig)
    base = cur.withColumn("emb_id", F.monotonically_increasing_id())

    if step.non_adjacent:
        forbidden = F.flatten(
            F.array(*[F.col("vsets")[j] for j in step.non_adjacent])
        )
    else:
        forbidden = F.expr("CAST(array() AS array<bigint>)")
    base = base.withColumn("forbidden", forbidden)

    # One candidate-vertex set per deduplicated constraint (Alg. 4 l.5).
    if not step.constraints:
        raise ValueError("EXPAND requires a connected matching order")
    branches = []
    for k, c in enumerate(step.constraints):
        candv = F.expr(
            f"""filter(vsets[{c.j}], (v, idx) ->
                    lsets[{c.j}][idx] = '{_sql_quote(c.label)}'
                    AND NOT array_contains(forbidden, v)
                    AND size(filter(vsets, a -> array_contains(a, v))) = {c.degree})"""
        )
        branches.append(
            base.select(
                "emb_id", F.lit(k).alias("ck"), F.explode(candv).alias("v")
            )
        )
    cons = reduce(DataFrame.unionByName, branches)

    # Posting-list union (join the inverted index) + intersection
    # (count distinct satisfied constraints == K), Alg. 4 l.6-7.
    k_total = len(step.constraints)
    postings = sh.index.where(F.col("sig") == s).select("v", "eid")
    cands = (
        cons.join(postings, "v")
        .select("emb_id", "ck", "eid")
        .distinct()
        .groupBy("emb_id", "eid")
        .agg(F.countDistinct("ck").alias("nck"))
        .where(F.col("nck") == k_total)
        .select("emb_id", "eid")
    )

    # Attach candidate hyperedge payloads and the embedding state.
    cand_edges = sh.edges.select(
        F.col("eid").alias("ceid"),
        F.col("vs").alias("cvs"),
        F.col("ls").alias("cls"),
    )
    joined = (
        cands.join(cand_edges, cands["eid"] == cand_edges["ceid"])
        .join(base.select("emb_id", "emb", "vsets", "lsets"), "emb_id")
        .where(~F.array_contains(F.col("emb"), F.col("eid")))
    )

    new_vsets = F.concat(F.col("vsets"), F.array(F.col("cvs")))
    joined = (
        joined.withColumn("emb", F.concat(F.col("emb"), F.array(F.col("eid"))))
        .withColumn("vsets", new_vsets)
        .withColumn("lsets", F.concat(F.col("lsets"), F.array(F.col("cls"))))
    )

    # Validation (Alg. 5): Obs. V.5 vertex count, then profile multiset.
    vcount_ok = (
        F.size(F.array_distinct(F.flatten(F.col("vsets"))))
        == F.lit(step.expected_vcount)
    )
    profiles = F.expr(
        f"""sort_array(transform(cvs, (v, idx) ->
                concat(cls[idx], '|',
                       array_join(
                           transform(
                               filter(sequence(0, {i}),
                                      j -> array_contains(element_at(vsets, j + 1), v)),
                               j -> cast(j as string)),
                           ','))))"""
    )
    expected = F.array(
        *[F.lit(p) for p in _expected_profile_strings(step)]
    )
    return (
        joined.where(vcount_ok)
        .where(profiles == expected)
        .select("emb", "vsets", "lsets")
    )


def spark_hgmatch(
    spark: SparkSession,
    sh: SparkHypergraph,
    q: Hypergraph,
    *,
    phi: list[int] | None = None,
) -> tuple[DataFrame, CompiledPlan]:
    """Build the full dataflow for query ``q``; returns the embeddings
    DataFrame (column ``emb``: matched hyperedge ids in phi order) plus
    the compiled plan. Lazily evaluated — SINK is the caller's action.
    """
    if phi is None:
        cards = sh.cardinalities()

        def card(sig) -> int:
            return cards.get(sig_str(sig), 0)

        phi = compute_matching_order(q, card)
    plan = compile_plan(q, phi)
    df = _scan(sh, plan.steps[0])
    for step in plan.steps[1:]:
        df = _expand(sh, step, df)
    return df.select("emb"), plan


def spark_hgmatch_count(
    spark: SparkSession,
    sh: SparkHypergraph,
    q: Hypergraph,
    *,
    phi: list[int] | None = None,
) -> int:
    """SINK(count): number of embeddings of ``q`` in ``sh``."""
    df, _ = spark_hgmatch(spark, sh, q, phi=phi)
    return df.count()


def collect_embeddings_query_edge_order(
    df: DataFrame, plan: CompiledPlan
) -> set[tuple[int, ...]]:
    """Collect embeddings re-aligned to query-hyperedge order, for
    cross-engine comparison in tests."""
    inv = {phi_e: i for i, phi_e in enumerate(plan.phi)}
    n = len(plan.phi)
    return {
        tuple(row["emb"][inv[k]] for k in range(n)) for row in df.collect()
    }
