"""Reconstructions of the paper's running-example graphs.

The paper shows the example graphs only as figures; the figures' edge lists
are not in the text. These reconstructions are *derived from the text's
stated facts* and satisfy every quantitative claim the paper makes about
them, which the tests in ``test_paper_examples.py`` verify:

Figure 3 graph (22 vertices v0..v21), γ=3:
  * vertex weight order exactly as Figure 4(a) (second row's weights are
    given verbatim: v13=13 … v14=3; first-row weights are any decreasing
    values above them — we use 24..14);
  * Example 3.1: τ₁ = ω(v11) = 18; G≥τ₁ has 7 vertices / 11 edges (size 18);
    growing by δ=2 adds v16 (0 edges), v1 (1 edge), …, stops after v5 at
    size 36 ⇒ τ₂ = ω(v5) = 12;
  * Example 3.2 / Figure 6: CountIC on G≥τ₂ removes {v9,v17,v18} as pre-core,
    then keys = [v5, v13, v7, v11] with groups {v5}, {v13}, {v7,v16,v6,v1},
    {v11,v20,v3,v12};
  * §2 problem statement: top-4 communities are {v3,v11,v12,v20}@18,
    {v1,v6,v7,v16}@14, {v3,v11,v12,v13,v20}@13, {v1,v5,v6,v7,v16}@12;
  * Example 2.1: {v3,v9,v10,v11,v12,v13,v20} is an influential 3-community
    with influence 9, and {v3,v10,v11,v12,v20} has min degree 3;
  * §5.1: the top-2 non-containment communities are the two 4-cliques.

Figure 1 graph (10 vertices), γ=3: exactly two influential 3-communities,
{v0,v1,v5,v6} with influence 10 and {v3,v4,v7,v8,v9} with influence 13, and
{v3,v4,v7,v8} has influence 13 but is not maximal.
"""
from repro.ref.graph import RefGraph

FIG3_WEIGHTS = {
    18: 24, 17: 23, 3: 22, 20: 21, 9: 20, 12: 19, 11: 18, 16: 17, 1: 16,
    6: 15, 7: 14, 13: 13, 5: 12, 0: 11, 15: 10, 10: 9, 8: 8, 21: 7,
    19: 6, 4: 5, 2: 4, 14: 3,
}

FIG3_EDGES = [
    # clique A {v3, v11, v12, v20}
    (3, 11), (3, 12), (3, 20), (11, 12), (11, 20), (12, 20),
    # clique B {v1, v6, v7, v16}
    (1, 6), (1, 7), (1, 16), (6, 7), (6, 16), (7, 16),
    # v13 hangs off clique A, v5 off clique B
    (13, 3), (13, 12), (13, 20),
    (5, 1), (5, 6), (5, 7),
    # high-weight fringe (v18, v17, v9) — degree < 3 in G≥18
    (18, 17), (18, 3), (17, 20), (9, 20), (9, 12),
    # v10 makes Example 2.1's g1/g2 work
    (10, 3), (10, 11), (10, 12), (10, 9),
    # v0 hangs off clique B
    (0, 5), (0, 6), (0, 1),
    # clique C {v15, v8, v21, v19} and its tail
    (15, 8), (15, 21), (15, 19), (8, 21), (8, 19), (21, 19),
    (4, 8), (4, 21), (4, 19),
    (2, 19), (2, 4), (2, 21),
    (14, 2), (14, 4), (14, 19),
    # loose cross links between the clusters
    (15, 0), (10, 8),
]


def fig3_graph() -> RefGraph:
    return RefGraph(dict(FIG3_WEIGHTS), FIG3_EDGES)


FIG1_WEIGHTS = {0: 10, 1: 15, 5: 16, 6: 17, 2: 5, 3: 18, 4: 19, 7: 13, 8: 20, 9: 14}

FIG1_EDGES = [
    # clique {v0, v1, v5, v6}
    (0, 1), (0, 5), (0, 6), (1, 5), (1, 6), (5, 6),
    # K4 {v3, v4, v7, v8} plus v9 attached through v7
    (3, 4), (3, 7), (3, 8), (4, 7), (4, 8), (7, 8),
    (7, 9), (4, 9), (8, 9),
    # v2 bridges the two clusters
    (2, 0), (2, 3),
]


def fig1_graph() -> RefGraph:
    return RefGraph(dict(FIG1_WEIGHTS), FIG1_EDGES)
