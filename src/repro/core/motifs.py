"""Sliding-window motif matching over a graph stream (paper Sec. 3, Alg. 2).

The :class:`WindowMatcher` maintains Loom's temporary partition ``P_temp``
(the window of the most recent motif-relevant edges) together with the
``matchList`` map: vertex -> set of ⟨edge-set, trie-node⟩ motif matches
containing that vertex. All isomorphism checks are incremental factor
arithmetic against the motif-filtered TPSTry++ — signatures are never
recomputed from scratch.

Per arriving edge ``e = (v1, v2)``:

1. If ``e``'s single-edge factors match no single-edge motif, it is
   rejected (the caller assigns it immediately via LDG; it never enters the
   window and displaces nothing).
2. Otherwise ``e`` joins the window and ``⟨{e}, m⟩`` joins matchList.
3. Every existing match touching ``v1`` or ``v2`` is extended with ``e`` if
   the match's trie node has a motif child whose factor difference equals
   ``fac(e, match)`` (Alg. 2 lines 4-8).
4. Every pair of matches drawn from matchList(v1) x matchList(v2) is
   recursively joined edge-by-edge from the smaller into the larger,
   recording a new match only when the smaller match is exhausted
   (Alg. 2 lines 11-18).

New matches never replace old ones; matches are dropped only when one of
their edges is permanently assigned to a partition (``remove_edges``).
"""
from __future__ import annotations

from collections import OrderedDict
from dataclasses import dataclass

from repro.core.tpstry import FactorKey, MotifIndex
from repro.graphs.model import Edge


@dataclass(frozen=True)
class Match:
    """A motif-matching sub-graph in the window: its window edge ids and
    the TPSTry++ node (motif) it matches."""

    eids: frozenset[int]
    node: FactorKey

    def __len__(self) -> int:
        return len(self.eids)


class WindowMatcher:
    """``P_temp`` + ``matchList`` state machine (one instance per stream)."""

    def __init__(self, motifs: MotifIndex, labels: dict[int, str]):
        self.motifs = motifs
        self.labels = labels  # shared, grows as the stream reveals vertices
        self.h = motifs.trie.h
        self.window: OrderedDict[int, Edge] = OrderedDict()  # eid -> Edge, arrival order
        self.match_list: dict[int, set[Match]] = {}  # vertex -> matches
        self._all: set[Match] = set()
        self._by_eid: dict[int, set[Match]] = {}  # edge -> matches containing it
        self._max_edges = motifs.max_motif_edges()
        # Per-edge-set vertex degrees (sub-graph degrees drive fac(e, g));
        # cached so hub vertices with hundreds of matches don't recompute
        # them for every arriving edge.
        self._deg: dict[frozenset[int], dict[int, int]] = {}
        # (label_u, label_v, deg_u_in_g, deg_v_in_g) -> fac key memo: the
        # incremental factors depend only on endpoint labels and their
        # current sub-graph degrees.
        self._fac_memo: dict[tuple[str, str, int, int], tuple[int, ...]] = {}

    # ---------------------------------------------------------------- utils
    def __len__(self) -> int:
        return len(self.window)

    def oldest(self) -> Edge | None:
        return next(iter(self.window.values()), None)

    def _edge_pairs(self, eids: frozenset[int]) -> list[tuple[int, int]]:
        return [self.window[i].endpoints() for i in eids]

    def _vertices(self, eids: frozenset[int]) -> set[int]:
        return {x for i in eids for x in self.window[i].endpoints()}

    def _degrees(self, eids: frozenset[int]) -> dict[int, int]:
        """Cached sub-graph degree map for a window edge set."""
        deg = self._deg.get(eids)
        if deg is None:
            deg = {}
            for i in eids:
                e = self.window[i]
                deg[e.u] = deg.get(e.u, 0) + 1
                deg[e.v] = deg.get(e.v, 0) + 1
            self._deg[eids] = deg
        return deg

    def _fac(self, e: Edge, eids: frozenset[int]) -> tuple[int, ...]:
        """``fac(e, g)`` via the degree cache and the per-label-type memo."""
        return self._fac_from_deg(e, self._degrees(eids))

    def _fac_from_deg(self, e: Edge, deg: dict[int, int]) -> tuple[int, ...]:
        lu, lv = self.labels[e.u], self.labels[e.v]
        key = (lu, lv, deg.get(e.u, 0), deg.get(e.v, 0))
        fac = self._fac_memo.get(key)
        if fac is None:
            fac = tuple(
                sorted(
                    (
                        self.h.edge_factor(lu, lv),
                        self.h.degree_factor(lu, key[2] + 1),
                        self.h.degree_factor(lv, key[3] + 1),
                    )
                )
            )
            self._fac_memo[key] = fac
        return fac

    def _record(self, m: Match) -> bool:
        """Insert a match into matchList for all its vertices; dedup."""
        if m in self._all:
            return False
        self._all.add(m)
        for v in self._vertices(m.eids):
            self.match_list.setdefault(v, set()).add(m)
        for eid in m.eids:
            self._by_eid.setdefault(eid, set()).add(m)
        return True

    # ------------------------------------------------------------ main path
    def offer(self, e: Edge) -> bool:
        """Process a new stream edge. Returns True if it entered the window
        (matched a single-edge motif), False if the caller must assign it
        immediately."""
        fac = self._fac(e, frozenset())
        node = self.motifs.single_edge_motif(fac)
        if node is None:
            return False
        self.window[e.eid] = e
        base = Match(frozenset([e.eid]), node)
        self._record(base)
        self._extend_with(e)
        self._join_pairs(e)
        return True

    def _extend_with(self, e: Edge) -> None:
        """Alg. 2 lines 4-8: grow each match touching e's endpoints by e."""
        u, v = e.endpoints()
        # Snapshot: _record mutates match_list while we iterate. Iteration
        # order does not affect the resulting match set (extensions are
        # independent and deduplicated).
        candidates = list(self.match_list.get(u, set()) | self.match_list.get(v, set()))
        for m in candidates:
            if e.eid in m.eids or len(m.eids) >= self._max_edges:
                continue
            fac = self._fac(e, m.eids)
            child = self.motifs.motif_child(m.node, fac)
            if child is not None:
                self._record(Match(m.eids | {e.eid}, child))

    def _join_pairs(self, e: Edge) -> None:
        """Alg. 2 lines 11-18: join matches across e's two endpoints.

        Any *newly formed* combined match must contain the just-arrived
        edge ``e`` (joins among older matches were already attempted when
        their own last edge arrived), so only pairs where at least one
        member contains ``e`` are tried.
        """
        u, v = e.endpoints()
        just_e = frozenset([e.eid])
        # A match already at the largest-motif size can never absorb
        # another edge; dropping those up front avoids a quadratic scan
        # over the (hub-vertex) match lists.
        ms1 = [m for m in self.match_list.get(u, set()) if len(m.eids) < self._max_edges]
        ms2 = [m for m in self.match_list.get(v, set()) if len(m.eids) < self._max_edges]
        for m1 in ms1:
            for m2 in ms2:
                if e.eid not in m1.eids and e.eid not in m2.eids:
                    continue
                if m1.eids == just_e or m2.eids == just_e:
                    # big + {e} is exactly what _extend_with already did,
                    # and {e} + {e'} reaches the same trie node as
                    # extending {e'} by e (the trie links every parent).
                    continue
                if m1 == m2 or m2.eids <= m1.eids or m1.eids <= m2.eids:
                    continue
                big, small = (m1, m2) if len(m1.eids) >= len(m2.eids) else (m2, m1)
                if len(big.eids) + len(small.eids - big.eids) > self._max_edges:
                    continue
                self._grow(big.eids, big.node, small.eids - big.eids)

    def _grow(
        self,
        base: frozenset[int],
        node: FactorKey,
        remaining: frozenset[int],
        deg: dict[int, int] | None = None,
    ) -> None:
        """Recursively add ``remaining`` edges to ``base``; record the match
        only when every edge has been placed ("grow ... updating matchList
        only if all edges from the smaller match have been added").

        ``deg`` carries the sub-graph degrees through the recursion so
        transient edge sets never enter the degree cache.
        """
        if not remaining:
            self._record(Match(base, node))
            return
        if deg is None:
            deg = self._degrees(base)
        for eid in sorted(remaining):
            e2 = self.window[eid]
            if e2.u not in deg and e2.v not in deg:
                continue  # trie children always add incident edges
            fac = self._fac_from_deg(e2, deg)
            child = self.motifs.motif_child(node, fac)
            if child is not None:
                ndeg = dict(deg)
                ndeg[e2.u] = ndeg.get(e2.u, 0) + 1
                ndeg[e2.v] = ndeg.get(e2.v, 0) + 1
                self._grow(base | {eid}, child, remaining - {eid}, ndeg)

    # ------------------------------------------------------------ eviction
    def matches_containing(self, eid: int) -> list[Match]:
        """All window matches containing edge ``eid``, sorted by descending
        motif support then ascending size (Sec. 4's support ordering; the
        single-edge match always sorts first by support monotonicity)."""
        out = self._by_eid.get(eid, set())
        return sorted(
            out,
            key=lambda m: (-self.motifs.support(m.node), len(m.eids), min(m.eids)),
        )

    def remove_edges(self, eids: set[int]) -> None:
        """Permanently assign edges: drop them from the window and drop
        every match touching any of them (their edges left ``P_temp``)."""
        doomed = set()
        for eid in eids:
            doomed |= self._by_eid.get(eid, set())
        for m in doomed:
            self._all.discard(m)
            for v in self._vertices(m.eids):
                s = self.match_list.get(v)
                if s is not None:
                    s.discard(m)
                    if not s:
                        del self.match_list[v]
            for eid in m.eids:
                s = self._by_eid.get(eid)
                if s is not None:
                    s.discard(m)
                    if not s:
                        del self._by_eid[eid]
            self._deg.pop(m.eids, None)
        for eid in eids:
            self.window.pop(eid, None)
