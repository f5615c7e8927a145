"""Peregrine mining applications (§3.2, Figure 4).

Each application is the paper's pattern program expressed over the
DataFrame matching engine:

* :func:`count_motifs` — Fig. 4e: vertex-induced counts of every
  connected pattern with ``size`` vertices;
* :func:`count_cliques` — k-clique counting;
* :func:`match_pattern` — pattern matching, optionally labeled /
  constrained / vertex-induced;
* :func:`exists_pattern` — Fig. 4f existence query with early
  termination (``limit(1)`` lets Spark cancel outstanding work once a
  witness is found — the dataflow analog of ``stopExploration()``);
* :func:`global_clustering_coefficient` / :func:`cc_exceeds` — Fig. 4b;
* :func:`fsm` — Fig. 4a: MNI-support frequent subgraph mining with
  dynamic label discovery and anti-monotone extension.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional

import pandas as pd
from pyspark.sql import DataFrame, functions as F

from .matcher import count_matches, match_df, vertex_orbits
from .pattern import (
    Pattern,
    clique,
    generate_all_vertex_induced,
    star,
)
from .plan import generate_plan

# Human names for the small motifs, keyed by canonical key.
MOTIF_NAMES = {
    star(3).canonical_key(): "wedge",
    clique(3).canonical_key(): "triangle",
}
_4 = {
    "path4": Pattern.of(4, [(0, 1), (1, 2), (2, 3)]),
    "star4": star(4),
    "cycle4": Pattern.of(4, [(0, 1), (1, 2), (2, 3), (0, 3)]),
    "tailed_triangle": Pattern.of(4, [(0, 1), (0, 2), (1, 2), (2, 3)]),
    "diamond": Pattern.of(4, [(0, 1), (0, 2), (1, 2), (1, 3), (2, 3)]),
    "clique4": clique(4),
}
MOTIF_NAMES.update({p.canonical_key(): n for n, p in _4.items()})


def motif_name(p: Pattern) -> str:
    return MOTIF_NAMES.get(p.canonical_key(), str(p))


def count_motifs(
    edges: DataFrame, size: int, symmetry_breaking: bool = True
) -> dict[str, int]:
    """Vertex-induced counts of all connected ``size``-vertex patterns
    (Fig. 4e). Returns ``{motif name: count}``."""
    out = {}
    for p in generate_all_vertex_induced(size):
        out[motif_name(p)] = count_matches(
            edges, p, induced=True, symmetry_breaking=symmetry_breaking
        )
    return out


def count_cliques(edges: DataFrame, k: int, symmetry_breaking: bool = True) -> int:
    """Number of k-cliques (edge- and vertex-induced coincide)."""
    return count_matches(edges, clique(k), symmetry_breaking=symmetry_breaking)


def match_pattern(
    edges: DataFrame,
    pattern: Pattern,
    labels: Optional[DataFrame] = None,
    induced: bool = False,
    symmetry_breaking: bool = True,
) -> int:
    """Count matches of an arbitrary (possibly labeled/constrained)
    pattern (Fig. 4d)."""
    return count_matches(
        edges, pattern, labels=labels, induced=induced,
        symmetry_breaking=symmetry_breaking,
    )


def exists_pattern(
    edges: DataFrame, pattern: Pattern, labels: Optional[DataFrame] = None
) -> bool:
    """Existence query with early termination (Fig. 4f / §5.3):
    ``limit(1)`` lets Spark cancel outstanding tasks once a witness row
    is produced."""
    return len(match_df(edges, pattern, labels=labels).limit(1).take(1)) > 0


def exists_clique(edges: DataFrame, k: int) -> bool:
    """k-clique existence query (the paper's 14-clique experiment).

    Staged early termination: a k-clique contains a j-clique for every
    j < k, so the search proceeds size-by-size and stops at the first
    absent size — the paper's observation that 'several partial
    explorations do not lead to a complete 14-clique' becomes an
    anti-monotone stop. (A single 14-clique join DAG would also be
    correct but costs Catalyst a 91-join plan; staging keeps each plan
    small, which is the dataflow analog of Peregrine abandoning a start
    vertex as soon as candidates run dry.)"""
    for j in range(3, k + 1):
        if not exists_pattern(edges, clique(j)):
            return False
    return True


def global_clustering_coefficient(edges: DataFrame) -> float:
    """3 × triangles / wedges, via two pattern counts (Fig. 4b uses the
    edge-induced 3-star = wedge for the triplet count)."""
    wedges = count_matches(edges, star(3))
    if wedges == 0:
        return 0.0
    triangles = count_matches(edges, clique(3))
    return 3.0 * triangles / wedges


def cc_exceeds(edges: DataFrame, bound: float) -> bool:
    """Fig. 4b existence query: is the global clustering coefficient
    above ``bound``? Counts wedges first, then triangles — the paper
    stops triangle counting early once the requisite count is reached;
    the batch analog computes the count and compares."""
    wedges = count_matches(edges, star(3))
    if wedges == 0:
        return False
    return count_matches(edges, clique(3)) * 3.0 > bound * wedges


# ---------------------------------------------------------------------------
# FSM (Fig. 4a): MNI support, dynamic label discovery, anti-monotonic growth
# ---------------------------------------------------------------------------
@dataclass
class FsmResult:
    """Frequent labeled patterns (canonical) with their MNI supports,
    plus the per-iteration pattern counts for reporting."""

    frequent: dict[Pattern, int]
    patterns_examined: int

    def by_key(self) -> dict[tuple, int]:
        return {p.canonical_key(): s for p, s in self.frequent.items()}


def _discover_supports(
    edges: DataFrame, labels: DataFrame, pattern: Pattern,
    symmetry_breaking: bool = True,
) -> dict[Pattern, int]:
    """Match a (partially) labeled pattern structure once, then compute
    the MNI support of every *fully labeled* canonical pattern realized
    by its matches (dynamic label discovery, §3.2.1).

    Single Spark job: matches are joined with the label table per
    wildcard position, melted to (label-tuple, position, vertex) rows,
    mapped through a small driver-built (label-tuple, position) →
    (canonical pattern, orbit) table, and aggregated with
    ``count_distinct`` per (pattern, orbit). Support = min over orbits
    (symmetric positions share a domain — see ``mni_support``).
    """
    df = match_df(edges, pattern, labels=labels, symmetry_breaking=symmetry_breaking)
    regs = sorted(pattern.regular_vertices)
    # attach the data label of every position (wildcards discovered here)
    lab = labels
    for u in regs:
        lu = lab.select(F.col("v").alias(f"v{u}"), F.col("label").alias(f"l{u}"))
        df = df.join(lu, on=f"v{u}", how="inner")
    lcols = [f"l{u}" for u in regs]
    tuples = [tuple(r) for r in df.select(*lcols).distinct().collect()]
    if not tuples:
        return {}

    # driver-side canonicalization of each realized label tuple
    canon_patterns: dict[tuple, Pattern] = {}
    map_rows = []
    for t in tuples:
        lt = {u: t[i] for i, u in enumerate(regs)}
        q = pattern.with_labels(
            [lt.get(u) if u in regs else None for u in range(pattern.n)]
        )
        qc = q.canonical()
        key = qc.canonical_key()
        canon_patterns.setdefault(key, qc)
        # the permutation used by canonical(): recompute the mapping by
        # finding any label/structure-preserving bijection q -> qc
        perm = _iso_map(q, qc)
        orbits = vertex_orbits(qc)
        orbit_of = {v: i for i, orb in enumerate(orbits) for v in orb}
        for i, u in enumerate(regs):
            map_rows.append(
                dict(
                    zip(lcols, t),
                    pos=i,
                    canon=str(key),
                    orbit=orbit_of[perm[u]],
                )
            )
    map_pdf = pd.DataFrame(map_rows)
    spark = edges.sparkSession
    map_df = F.broadcast(spark.createDataFrame(map_pdf))

    stack_expr = "stack({}, {}) as (pos, v)".format(
        len(regs), ", ".join(f"{i}, v{u}" for i, u in enumerate(regs))
    )
    stacked = df.select(*lcols, F.expr(stack_expr))
    per_orbit = (
        stacked.join(map_df, on=lcols + ["pos"], how="inner")
        .groupBy("canon", "orbit")
        .agg(F.count_distinct("v").alias("dom"))
        .collect()
    )
    supports: dict[str, int] = {}
    for row in per_orbit:
        supports[row["canon"]] = min(
            supports.get(row["canon"], 1 << 60), row["dom"]
        )
    return {
        canon_patterns[key]: supports[str(key)]
        for key in canon_patterns
        if str(key) in supports
    }


def _iso_map(p: Pattern, q: Pattern) -> dict[int, int]:
    """A structure/label-preserving bijection from p's vertices to q's
    (both are the same canonical pattern up to relabeling)."""
    import itertools

    for perm in itertools.permutations(range(p.n)):
        if all(p.labels[v] == q.labels[perm[v]] for v in range(p.n)) and (
            frozenset(
                (min(perm[a], perm[b]), max(perm[a], perm[b])) for a, b in p.edges
            )
            == q.edges
            and frozenset(
                (min(perm[a], perm[b]), max(perm[a], perm[b]))
                for a, b in p.anti_edges
            )
            == q.anti_edges
            and frozenset(perm[v] for v in p.anti_vertices) == q.anti_vertices
        ):
            return {v: perm[v] for v in range(p.n)}
    raise AssertionError("patterns are not isomorphic")


def fsm(
    edges: DataFrame,
    labels: DataFrame,
    threshold: int,
    max_edges: int = 3,
    symmetry_breaking: bool = True,
) -> FsmResult:
    """Figure 4a: start from the unlabeled 2-edge pattern (the wedge),
    discover frequent labeled patterns, and iteratively ``extendByEdge``
    until ``max_edges``, pruning by anti-monotonicity of MNI support
    (if no labeling of any ``k``-edge structure is frequent, no
    ``k+1``-edge pattern can be, so iteration stops).

    Candidate labelings of one structure are matched as a *batch*: the
    structure is matched once with wildcard labels and every realized
    labeling's MNI support falls out of the same match DataFrame
    (``_discover_supports``) — the dataflow analog of Peregrine matching
    a set of patterns in one exploration pass. A per-labeled-candidate
    match loop gives identical results but pays one Spark job per
    pattern, which at lite scale is pure scheduler overhead.
    """
    from .pattern import extend_by_edge, generate_all_edge_induced

    structures: list[Pattern] = generate_all_edge_induced(2)
    frequent: dict[tuple, tuple[Pattern, int]] = {}
    examined = 0
    for ne in range(2, max_edges + 1):
        fertile: list[Pattern] = []  # structures with >= 1 frequent labeling
        for shape in structures:
            examined += 1
            found = False
            for q, support in _discover_supports(
                edges, labels, shape, symmetry_breaking=symmetry_breaking
            ).items():
                if support >= threshold and q.canonical_key() not in frequent:
                    frequent[q.canonical_key()] = (q, support)
                    found = True
            if found:
                fertile.append(shape)
        if not fertile or ne == max_edges:
            break
        structures = [
            s for s in extend_by_edge(fertile) if len(s.edges) == ne + 1
        ]
    return FsmResult(
        frequent={p: s for p, s in frequent.values()},
        patterns_examined=examined,
    )
