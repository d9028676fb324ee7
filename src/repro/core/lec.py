"""LEC features (Definitions 6–9, Algorithm 1).

A *local partial match equivalence class* (LEC) groups all PMs of a fragment
that share the same crossing edges mapped to the same query edges; Theorem 1
shows they then match the same query subgraph, and Theorem 2 that joinability
is a property of the class, not of its members. The *LEC feature* is the
compact representative shipped to the coordinator:

    LF = (fragment id, g: crossing edge → query edge, LECSign bitstring)

In dataflow form Algorithm 1 is a projection + distinct over the PM
DataFrame: every PM row already carries ``(frag, cmap, sign)``, which *is*
its feature.
"""
from __future__ import annotations

import json
from dataclasses import dataclass

from pyspark.sql import DataFrame


@dataclass(frozen=True)
class LECFeature:
    """One LEC feature; ``cmap`` entries are ``"qeIdx##s|p|o"`` strings."""

    frag: int
    cmap: tuple[str, ...]
    sign: int

    def qe_map(self) -> dict[str, str]:
        """Query-edge index → crossing data edge."""
        out = {}
        for entry in self.cmap:
            qe, edge = entry.split("##", 1)
            out[qe] = edge
        return out

    def ser_bytes(self) -> int:
        """Serialized size, for the data-shipment accounting (§IV-D)."""
        return len(
            json.dumps({"f": self.frag, "g": list(self.cmap), "s": self.sign})
        )


def compute_lec_features(pm_df: DataFrame) -> list[LECFeature]:
    """Algorithm 1: distinct (frag, g, LECSign) over the PM stream.

    Features are collected to the driver — the paper's coordinator — whose
    total payload is what §IV-D bounds by the query size and the number of
    crossing edges (*partition-bounded* data shipment).
    """
    rows = pm_df.select("frag", "cmap", "sign").distinct().collect()
    return [
        LECFeature(int(r["frag"]), tuple(r["cmap"]), int(r["sign"]))
        for r in rows
    ]


def maps_compatible(a: dict[str, str], b: dict[str, str]) -> tuple[bool, bool]:
    """(shares ≥1 identical mapping, has no conflicting mapping).

    Conditions 2 and 3 of Definition 9: the two features must agree on at
    least one crossing edge, and may not map the same query edge to
    different data edges.
    """
    shared = False
    for qe, edge in a.items():
        other = b.get(qe)
        if other is None:
            continue
        if other != edge:
            return shared, False
        shared = True
    return shared, True


def joinable(a: LECFeature, b: LECFeature) -> bool:
    """Definition 9: can members of these two LECs join?"""
    if a.frag == b.frag:  # condition 1
        return False
    if a.sign & b.sign:  # condition 4
        return False
    shared, ok = maps_compatible(a.qe_map(), b.qe_map())
    return shared and ok  # conditions 2 and 3


def feature_groups(features: list[LECFeature]) -> dict[int, list[LECFeature]]:
    """Definition 10: group features by LECSign (Theorem 5: same-sign
    features are never joinable, so intra-group joins are skipped)."""
    groups: dict[int, list[LECFeature]] = {}
    for f in features:
        groups.setdefault(f.sign, []).append(f)
    return groups


def group_join_graph(groups: dict[int, list[LECFeature]]) -> set[tuple[int, int]]:
    """Join-graph edges between sign-groups: two groups are adjacent iff
    some pair of their features is joinable (Figs 6–7)."""
    signs = sorted(groups)
    edges: set[tuple[int, int]] = set()
    for i, sa in enumerate(signs):
        for sb in signs[i + 1 :]:
            if sa & sb:
                continue
            if any(
                joinable(fa, fb) for fa in groups[sa] for fb in groups[sb]
            ):
                edges.add((sa, sb))
    return edges
