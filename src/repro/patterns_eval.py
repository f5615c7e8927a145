"""Figure 9 evaluation patterns p1..p8.

The paper's Figure 9 is an image (not present in the text source); p7
and p8 are described exactly in §6.5 and are reproduced faithfully.
p1..p6 are documented stand-ins covering the pattern families of the
Fractal and G-Miner evaluations the paper says Figure 9 spans (sizes
3–5, sparse to dense, labeled p2 for the G-Miner comparison) — see
DESIGN.md § Substitutions.
"""
from __future__ import annotations

from .core.pattern import Pattern, clique

#: p1 — diamond / chordal square (4-cycle with one chord); used for the
#: scalability study in §6.7.
P1 = Pattern.of(4, [(0, 1), (0, 2), (1, 2), (1, 3), (2, 3)])

#: p2 — labeled triangle (G-Miner's pattern-matching app is specific to
#: labeled p2; labels 1-3 are synthetic, as the paper adds labels 1-6 to
#: Orkut/Friendster).
P2 = clique(3).with_labels([1, 2, 3])

#: p3 — house: 5-cycle plus a chord (the most expensive of the unlabeled
#: stand-ins).
P3 = Pattern.of(5, [(0, 1), (1, 2), (2, 3), (3, 4), (0, 4), (1, 4)])

#: p4 — tailed triangle.
P4 = Pattern.of(4, [(0, 1), (0, 2), (1, 2), (2, 3)])

#: p5 — 4-chain (path with 4 vertices).
P5 = Pattern.of(4, [(0, 1), (1, 2), (2, 3)])

#: p6 — near-5-clique (5-clique minus one edge).
P6 = clique(5).remove_edge(3, 4)

#: p7 — maximal triangle: a triangle with a fully-connected anti-vertex
#: (matches every triangle not contained in a 4-clique), §6.5.
P7 = clique(3).add_anti_vertex([0, 1, 2])

#: p8 — vertex-induced chordal square: diamond with an anti-edge between
#: the two non-adjacent vertices, §6.5.
P8 = P1.add_anti_edge(0, 3)

EVAL_PATTERNS = {
    "p1": P1,
    "p2": P2,
    "p3": P3,
    "p4": P4,
    "p5": P5,
    "p6": P6,
    "p7": P7,
    "p8": P8,
}
