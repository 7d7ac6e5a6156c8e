"""The paper's running example (Fig. 1a) and every hand-derivable expected
value from Figs. 1-4 / Examples 1-8.

Vertex encoding: s=0, a=1, b=2, c=3, d=4, e=5, f=6, t=7.
The 14 edges are reconstructed from the text:

* Example 5 lists N_out(s) = {(b,2), (a,3), (d,4)} and the updates
  A(d)->3 via b and the no-op via (a,d,5);
* Example 3 lists all temporal paths s->f and f->t, pinning
  (b,c,3), (c,f,4), (b,f,5), (f,e,5), (e,c,6), (c,t,7), (f,b,5), (b,t,6);
* Example 4 prunes (s,a,3) and (d,t,2).
"""
from repro.graph.adjacency import TemporalAdjacency

S, A, B, C, D, E, F, T = 0, 1, 2, 3, 4, 5, 6, 7
NAMES = {0: "s", 1: "a", 2: "b", 3: "c", 4: "d", 5: "e", 6: "f", 7: "t"}

EDGES = [
    (S, B, 2),
    (S, A, 3),
    (S, D, 4),
    (B, C, 3),
    (B, D, 3),
    (B, F, 5),
    (B, T, 6),
    (C, F, 4),
    (C, T, 7),
    (F, E, 5),
    (F, B, 5),
    (E, C, 6),
    (A, D, 5),
    (D, T, 2),
]

TB, TE = 2, 7

# Fig. 3(a)/(b): polarity times within [2, 7] (A(s)=tb-1, D(t)=te+1).
EXPECTED_ARRIVAL = {S: 1, B: 2, A: 3, C: 3, D: 3, F: 4, E: 5}
EXPECTED_DEPARTURE = {T: 8, B: 6, C: 7, D: 2, F: 5, E: 6}

# Fig. 3(c): quick upper-bound graph.
EXPECTED_GQ = sorted(
    [
        (S, B, 2),
        (B, C, 3),
        (B, T, 6),
        (C, F, 4),
        (C, T, 7),
        (F, E, 5),
        (F, B, 5),
        (E, C, 6),
    ]
)

# Fig. 4(a): TCV.(s, .) entries (u -> [(ts, set)] ascending).  Lemma-7
# pruning completes b immediately at its first entry {b}, so the in-edge
# (f,b,5) adds no second entry.
EXPECTED_TCV_S = {
    B: [(2, frozenset({B}))],
    C: [(3, frozenset({B, C})), (6, frozenset({B, C}))],
    F: [(4, frozenset({B, C, F}))],
    E: [(5, frozenset({B, C, F, E}))],
}

# Fig. 4(b): TCV.(., t) entries (u -> [(ts, set)] descending).  c completes
# at its first entry {c} (τ=7), b at {b} (τ=6), f at {f} after the second
# same-timestamp intersection of Example 7.
EXPECTED_TCV_T = {
    C: [(7, frozenset({C}))],
    B: [(6, frozenset({B}))],
    E: [(6, frozenset({C, E}))],
    F: [(5, frozenset({F}))],
}

# Fig. 4(c): tight upper-bound graph (e(f,e,5), e(f,b,5), e(e,c,6) pruned).
EXPECTED_GT = sorted(
    [
        (S, B, 2),
        (B, C, 3),
        (B, T, 6),
        (C, F, 4),
        (C, T, 7),
    ]
)

# Fig. 1(b)/(c): the two temporal simple paths and the exact tspG (EEV must
# additionally reject e(c,f,4) from Gt).
EXPECTED_PATHS = [
    [(S, B, 2), (B, C, 3), (C, T, 7)],
    [(S, B, 2), (B, T, 6)],
]
EXPECTED_TSPG = sorted([(S, B, 2), (B, C, 3), (B, T, 6), (C, T, 7)])


def example_adjacency() -> TemporalAdjacency:
    return TemporalAdjacency(EDGES)
