"""Synthetic labelled-graph generators standing in for Table 1's datasets.

The paper evaluates on DBLP, ProvGen, MusicBrainz and LUBM (Table 1). The
dumps are unavailable offline and far exceed single-container scale, so
each dataset is substituted by a seeded generator that preserves what
Loom's results actually depend on (DESIGN.md Sec. 3):

* the **label-set size** |L_V| — the heterogeneity column of Table 1 (8,
  3, 12, 15), which drives how skewed a pattern workload can be;
* the **edge : vertex ratio** of the original (≈2.1, 1.8, 3.2, 4.2);
* a relational-style **schema of allowed label pairs**, so edge types are
  a sparse subset of L_V x L_V and query patterns select subsets of edges;
* **Zipf-skewed popularity** on the "many-to-one" side of each relation
  (citations, venues, labels, courses), giving heavy-tailed degrees.

Every generator is deterministic in ``(scale, seed)``. ``scale`` is the
approximate vertex count: tests use ~1-2k, benchmarks/experiments ~10-30k.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.model import LabeledGraph, norm_edge


@dataclass(frozen=True)
class Relation:
    """A typed relation: each ``src``-class vertex gets ~Poisson(mean_deg)
    edges to ``dst``-class vertices drawn with Zipf(zipf) popularity."""

    src: str
    dst: str
    mean_deg: float
    zipf: float = 1.0


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1, dtype="float64") ** alpha
    return w / w.sum()


def schema_graph(
    classes: dict[str, float],
    relations: list[Relation],
    *,
    scale: int,
    seed: int,
) -> LabeledGraph:
    """Generate a labelled graph from a vertex-class/relation schema."""
    g = np.random.default_rng(seed)
    counts = {c: max(1, int(round(f * scale))) for c, f in classes.items()}
    ranges: dict[str, tuple[int, int]] = {}
    nxt = 0
    for c in classes:  # contiguous id block per class, insertion order
        ranges[c] = (nxt, nxt + counts[c])
        nxt += counts[c]
    labels = {
        vid: c for c, (lo, hi) in ranges.items() for vid in range(lo, hi)
    }
    edges: set[tuple[int, int]] = set()
    for rel in relations:
        s_lo, s_hi = ranges[rel.src]
        d_lo, d_hi = ranges[rel.dst]
        n_src, n_dst = s_hi - s_lo, d_hi - d_lo
        degs = g.poisson(rel.mean_deg, n_src)
        total = int(degs.sum())
        if total == 0:
            continue
        # Zipf popularity over destination ids (shuffled so popularity is
        # not correlated with id order across relations).
        perm = g.permutation(n_dst)
        dsts = d_lo + perm[g.choice(n_dst, size=total, p=_zipf_weights(n_dst, rel.zipf))]
        srcs = np.repeat(np.arange(s_lo, s_hi), degs)
        for u, v in zip(srcs.tolist(), dsts.tolist()):
            if u != v:
                edges.add(norm_edge(u, v))
    return LabeledGraph(labels, sorted(edges))


def dblp_lite(*, scale: int = 2000, seed: int = 11) -> LabeledGraph:
    """DBLP substitute: 8 labels, E/V ≈ 2.1 (paper: 1.2M/2.5M)."""
    classes = {
        "Author": 0.42,
        "Paper": 0.42,
        "Venue": 0.02,
        "Year": 0.004,
        "Publisher": 0.006,
        "School": 0.03,
        "Editor": 0.06,
        "Series": 0.01,
    }
    # Queried edge types (A-P, P-P, P-V, V-Publisher) deliberately cover
    # only ~half of all edges — pattern workloads traverse "a limited
    # subset of edges and edge types" (paper Sec. 1), which is what makes
    # a workload-aware partitioning matter. The rest is bibliographic
    # housekeeping (years, affiliations, editorships) no query touches.
    relations = [
        Relation("Paper", "Author", 2.0, zipf=0.8),   # authorship
        Relation("Paper", "Paper", 0.6, zipf=1.1),    # citations
        Relation("Paper", "Venue", 0.6, zipf=1.0),    # published-at
        Relation("Venue", "Publisher", 0.8, zipf=0.9),
        Relation("Paper", "Year", 0.6, zipf=0.4),
        Relation("Venue", "Series", 0.5, zipf=0.8),
        Relation("Editor", "Venue", 1.5, zipf=0.9),
        Relation("Author", "School", 0.3, zipf=1.0),
    ]
    return schema_graph(classes, relations, scale=scale, seed=seed)


def provgen_lite(*, scale: int = 2000, seed: int = 13) -> LabeledGraph:
    """ProvGen substitute: 3 PROV labels, E/V ≈ 1.8 (paper: 0.5M/0.9M)."""
    classes = {"Entity": 0.60, "Activity": 0.30, "Agent": 0.10}
    # With only 3 labels the queried types unavoidably cover most edges —
    # ProvGen is the paper's least heterogeneous dataset and the one where
    # Loom's advantage is smallest (Sec. 5.2). Attribution/delegation/
    # communication edges provide the unqueried mass that exists.
    relations = [
        Relation("Entity", "Entity", 0.5, zipf=0.9),    # wasDerivedFrom
        Relation("Entity", "Activity", 1.0, zipf=0.8),  # wasGeneratedBy
        Relation("Activity", "Entity", 0.8, zipf=1.0),  # used
        Relation("Activity", "Agent", 1.0, zipf=1.1),   # wasAssociatedWith
        Relation("Entity", "Agent", 0.5, zipf=1.2),     # wasAttributedTo
        Relation("Activity", "Activity", 0.5, zipf=1.0),  # wasInformedBy
        Relation("Agent", "Agent", 0.4, zipf=1.0),      # actedOnBehalfOf
    ]
    return schema_graph(classes, relations, scale=scale, seed=seed)


def musicbrainz_lite(*, scale: int = 2000, seed: int = 17) -> LabeledGraph:
    """MusicBrainz substitute: 12 labels, E/V ≈ 3.2 (paper: 31M/100M)."""
    classes = {
        "Artist": 0.20,
        "Album": 0.14,
        "Track": 0.33,
        "Release": 0.10,
        "Work": 0.08,
        "Recording": 0.06,
        "Label": 0.03,
        "Place": 0.02,
        "Event": 0.01,
        "Genre": 0.01,
        "Country": 0.01,
        "Area": 0.01,
    }
    # Queried types (Track-Album, Album-Artist, Album-Release,
    # Release-Label, Artist-Country, Artist-Genre) are ~1/3 of edges; the
    # bulk is recording/work/event metadata no workload query traverses —
    # mirroring the real 100M-edge MusicBrainz, where any handful of query
    # patterns touches a sliver of the relationship types.
    relations = [
        Relation("Album", "Artist", 1.5, zipf=1.1),     # credited-to
        Relation("Track", "Album", 1.5, zipf=0.7),      # appears-on
        Relation("Album", "Release", 1.0, zipf=0.7),
        Relation("Release", "Label", 1.0, zipf=1.2),    # released-on
        Relation("Artist", "Country", 0.6, zipf=1.3),
        Relation("Artist", "Genre", 0.8, zipf=1.2),
        Relation("Track", "Recording", 1.0, zipf=0.8),
        Relation("Track", "Work", 0.5, zipf=0.9),
        Relation("Recording", "Work", 2.5, zipf=0.9),
        Relation("Work", "Artist", 0.8, zipf=1.1),      # composed-by
        Relation("Artist", "Artist", 0.4, zipf=1.0),    # collaboration
        Relation("Album", "Genre", 0.6, zipf=1.2),
        Relation("Artist", "Event", 0.4, zipf=1.0),     # performed-at
        Relation("Event", "Place", 1.5, zipf=1.0),
        Relation("Place", "Area", 1.0, zipf=1.0),
        Relation("Recording", "Place", 1.0, zipf=1.0),  # recorded-at
        Relation("Work", "Work", 0.8, zipf=1.0),        # part-of
        Relation("Label", "Country", 1.0, zipf=1.2),
    ]
    return schema_graph(classes, relations, scale=scale, seed=seed)


def lubm_lite(*, scale: int = 2000, seed: int = 19) -> LabeledGraph:
    """LUBM substitute: 15 labels, E/V ≈ 4.2 (paper: 2.6M/11M at LUBM-100)."""
    classes = {
        "University": 0.005,
        "Department": 0.015,
        "FullProfessor": 0.01,
        "AssociateProfessor": 0.015,
        "AssistantProfessor": 0.015,
        "Lecturer": 0.01,
        "UndergraduateStudent": 0.36,
        "GraduateStudent": 0.14,
        "Course": 0.05,
        "GraduateCourse": 0.03,
        "Publication": 0.26,
        "ResearchGroup": 0.02,
        "TeachingAssistant": 0.02,
        "ResearchAssistant": 0.01,
        "Chair": 0.005,
    }
    relations = [
        Relation("Department", "University", 1.0, zipf=0.8),  # subOrganizationOf
        Relation("ResearchGroup", "Department", 1.0, zipf=0.8),
        Relation("FullProfessor", "Department", 1.0, zipf=0.8),  # worksFor
        Relation("AssociateProfessor", "Department", 1.0, zipf=0.8),
        Relation("AssistantProfessor", "Department", 1.0, zipf=0.8),
        Relation("Lecturer", "Department", 1.0, zipf=0.8),
        Relation("Chair", "Department", 1.0, zipf=0.8),  # headOf
        Relation("UndergraduateStudent", "Department", 1.0, zipf=0.8),  # memberOf
        Relation("GraduateStudent", "Department", 1.0, zipf=0.8),
        Relation("UndergraduateStudent", "Course", 4.0, zipf=0.9),  # takesCourse
        Relation("GraduateStudent", "GraduateCourse", 3.5, zipf=0.9),
        Relation("GraduateStudent", "FullProfessor", 0.6, zipf=1.1),  # advisor
        Relation("FullProfessor", "Course", 1.0, zipf=0.6),  # teacherOf
        Relation("AssociateProfessor", "Course", 1.0, zipf=0.6),
        Relation("Lecturer", "Course", 1.5, zipf=0.6),
        Relation("Publication", "FullProfessor", 0.8, zipf=1.2),  # publicationAuthor
        Relation("Publication", "AssociateProfessor", 0.6, zipf=1.2),
        Relation("Publication", "GraduateStudent", 0.8, zipf=1.0),
        Relation("TeachingAssistant", "Course", 1.0, zipf=0.8),
        Relation("ResearchAssistant", "ResearchGroup", 1.0, zipf=0.8),
    ]
    return schema_graph(classes, relations, scale=scale, seed=seed)


DATASETS = {
    "dblp": dblp_lite,
    "provgen": provgen_lite,
    "musicbrainz": musicbrainz_lite,
    "lubm": lubm_lite,
}

# Paper Table 1, for side-by-side reporting (|V|, |E|, |L_V|, real?).
PAPER_TABLE1 = {
    "dblp": ("1.2M", "2.5M", 8, "Y"),
    "provgen": ("0.5M", "0.9M", 3, "N"),
    "musicbrainz": ("31M", "100M", 12, "Y"),
    "lubm": ("2.6M", "11M", 15, "N"),       # LUBM-100
    "lubm4000": ("131M", "534M", 15, "N"),  # throughput-only in the paper
}


def generate(name: str, *, scale: int = 2000, seed: int | None = None) -> LabeledGraph:
    """Generate a dataset substitute by name ('lubm4000' maps to lubm_lite
    at 4x the requested scale, as it differs only in size)."""
    if name == "lubm4000":
        return lubm_lite(scale=scale * 4, seed=19 if seed is None else seed)
    fn = DATASETS[name]
    return fn(scale=scale) if seed is None else fn(scale=scale, seed=seed)
