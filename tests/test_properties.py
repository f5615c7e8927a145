"""Property-based tests (hypothesis) for the pure-Python layers:
canonical-form invariance, plan invariants, engine-vs-reference
consistency on random graphs (reference + SQL only — the Spark engine's
random-graph checks live in test_matcher.py with fixed seeds)."""
import random

import duckdb
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.pattern import Pattern, _norm_edge
from repro.core.plan import break_symmetries, generate_plan, min_connected_vertex_cover
from repro.graph.gengraph import from_edge_list
from repro.oracle_sql import count_sql
from repro.reference import RefGraph, ref_count


@st.composite
def connected_patterns(draw):
    """Random connected unlabeled pattern with 2..5 vertices."""
    n = draw(st.integers(2, 5))
    # random spanning tree + extra edges
    rnd = random.Random(draw(st.integers(0, 10**6)))
    edges = set()
    for v in range(1, n):
        edges.add(_norm_edge(v, rnd.randrange(v)))
    pairs = [(a, b) for a in range(n) for b in range(a + 1, n) if (a, b) not in edges]
    for e in pairs:
        if draw(st.booleans()):
            edges.add(e)
    return Pattern.of(n, edges)


@st.composite
def small_graphs(draw):
    """Random connected-ish data graph with <= 14 vertices."""
    n = draw(st.integers(4, 14))
    rnd = random.Random(draw(st.integers(0, 10**6)))
    edges = [(v, rnd.randrange(v)) for v in range(1, n)]
    extra = draw(st.integers(0, 2 * n))
    for _ in range(extra):
        a, b = rnd.randrange(n), rnd.randrange(n)
        if a != b:
            edges.append((min(a, b), max(a, b)))
    return sorted(set(_norm_edge(a, b) for a, b in edges))


class TestPatternProperties:
    @settings(max_examples=60, deadline=None)
    @given(connected_patterns(), st.integers(0, 10**6))
    def test_canonical_key_invariant_under_relabeling(self, p, seed):
        rnd = random.Random(seed)
        perm = list(range(p.n))
        rnd.shuffle(perm)
        q = Pattern.of(
            p.n, {_norm_edge(perm[a], perm[b]) for a, b in p.edges}
        )
        assert p.canonical_key() == q.canonical_key()

    @settings(max_examples=60, deadline=None)
    @given(connected_patterns())
    def test_automorphism_count_divides_factorial(self, p):
        import math

        assert math.factorial(p.n) % len(p.automorphisms()) == 0

    @settings(max_examples=60, deadline=None)
    @given(connected_patterns())
    def test_symmetry_breaking_leaves_identity(self, p):
        po = break_symmetries(p)
        survivors = [
            a for a in p.automorphisms() if all(a[u] < a[v] for u, v in po)
        ]
        assert survivors == [tuple(range(p.n))]

    @settings(max_examples=60, deadline=None)
    @given(connected_patterns())
    def test_cover_is_minimal_cover(self, p):
        import itertools

        cover = min_connected_vertex_cover(p)
        cset = set(cover)
        assert all(a in cset or b in cset for a, b in p.edges)
        # no *connected* cover of smaller size exists
        for smaller in itertools.combinations(range(p.n), len(cover) - 1):
            sset = set(smaller)
            if all(a in sset or b in sset for a, b in p.edges):
                adj = {v: set(p.get_neighbors(v)) & sset for v in smaller}
                seen = {smaller[0]} if smaller else set()
                stack = list(seen)
                while stack:
                    for w in adj[stack.pop()]:
                        if w not in seen:
                            seen.add(w)
                            stack.append(w)
                assert seen != sset or not smaller

    @settings(max_examples=40, deadline=None)
    @given(connected_patterns())
    def test_plan_vertex_order_covers_all(self, p):
        plan = generate_plan(p)
        assert sorted(plan.vertex_order) == list(p.regular_vertices)


class TestReferenceVsSqlProperties:
    @settings(max_examples=25, deadline=None)
    @given(connected_patterns(), small_graphs())
    def test_sql_equals_reference(self, p, edges):
        if not edges:
            return
        g = from_edge_list(edges)
        rg = RefGraph(g.edge_tuples())
        con = duckdb.connect()
        try:
            con.register("edges", g.edges_pdf)
            got = int(con.execute(count_sql(p)).fetchone()[0])
        finally:
            con.close()
        assert got == ref_count(rg, p)

    @settings(max_examples=20, deadline=None)
    @given(connected_patterns(), small_graphs())
    def test_symmetry_break_count_times_aut(self, p, edges):
        if not edges:
            return
        rg = RefGraph(edges)
        a = ref_count(rg, p, symmetry_breaking=True)
        b = ref_count(rg, p, symmetry_breaking=False)
        assert b == a * len(p.automorphisms())

    @settings(max_examples=20, deadline=None)
    @given(connected_patterns(), small_graphs())
    def test_induced_counts_via_theorem31(self, p, edges):
        from repro.core.plan import vertex_induced_rewrite

        if not edges:
            return
        rg = RefGraph(edges)
        assert ref_count(rg, p, induced=True) == ref_count(
            rg, vertex_induced_rewrite(p)
        )
