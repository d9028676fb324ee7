"""LEC feature-based pruning (Algorithm 2, §IV-C).

The coordinator joins LEC features over the group join graph; a feature
survives iff it participates in at least one feature combination whose
LECSigns OR to all-ones (Theorem 4) — every other feature's PMs can be
discarded before assembly.

Our formulation is a forward state-space fixpoint equivalent to the DFS of
Algorithm 2: a *state* is the (sign, merged g) of a connected, pairwise
sign-disjoint feature combination. States are expanded feature-by-feature
(requiring a shared crossing-edge mapping — the join-graph adjacency — plus
Def 9's compatibility), each expansion edge is recorded, and a backward
sweep from all-ones states marks exactly the features lying on some
successful derivation. Exploring states instead of feature *sets* keeps the
space polynomial in the number of distinct (sign, g) combinations while
marking the same surviving features.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.lec import LECFeature, maps_compatible


@dataclass
class PruneResult:
    """Outcome of Algorithm 2 over a feature set."""

    surviving: set[int]  # indices into the input feature list
    complete: bool = True  # False if the state-space guard tripped
    n_states: int = 0


def prune_features(
    features: list[LECFeature],
    full_sign: int,
    *,
    max_states: int = 200_000,
) -> PruneResult:
    """Return the indices of features that can contribute to a complete
    match. If the state space exceeds ``max_states`` the guard trips and
    everything is kept (pruning is an optimization; keeping more is sound).
    """
    qe_maps = [f.qe_map() for f in features]
    # join-graph adjacency is "shares a crossing-edge mapping": index the
    # features by cmap entry so expansion only probes plausible partners.
    by_entry: dict[str, list[int]] = {}
    for i, f in enumerate(features):
        for e in f.cmap:
            by_entry.setdefault(e, []).append(i)

    # state key: (sign, frozenset of "qe##edge" entries)
    def key_of(sign: int, entries: frozenset) -> tuple:
        return (sign, entries)

    init: dict[tuple, list[int]] = {}
    for i, f in enumerate(features):
        k = key_of(f.sign, frozenset(f.cmap))
        init.setdefault(k, []).append(i)

    # forward exploration ---------------------------------------------------
    # state -> list of (parent_state | None, feature_idx) derivation edges
    parents: dict[tuple, list[tuple[tuple | None, int]]] = {}
    for k, idxs in init.items():
        parents[k] = [(None, i) for i in idxs]
    queue = list(parents)
    state_maps: dict[tuple, dict[str, str]] = {
        k: _entries_to_map(k[1]) for k in parents
    }
    while queue:
        k = queue.pop()
        sign, entries = k
        if sign == full_sign:
            continue  # complete states need no expansion
        smap = state_maps[k]
        cands: set[int] = set()
        for e in entries:
            cands.update(by_entry.get(e, ()))
        for j in sorted(cands):
            feat = features[j]
            if sign & feat.sign:
                continue
            shared, ok = maps_compatible(smap, qe_maps[j])
            if not (shared and ok):
                continue
            nk = key_of(sign | feat.sign, entries | frozenset(feat.cmap))
            if nk not in parents:
                if len(parents) >= max_states:
                    return PruneResult(
                        set(range(len(features))), complete=False,
                        n_states=len(parents),
                    )
                parents[nk] = []
                state_maps[nk] = _entries_to_map(nk[1])
                queue.append(nk)
            parents[nk].append((k, j))

    # backward marking from all-ones states --------------------------------
    surviving: set[int] = set()
    marked: set[tuple] = set()
    stack = [k for k in parents if k[0] == full_sign]
    marked.update(stack)
    while stack:
        k = stack.pop()
        for parent, j in parents[k]:
            surviving.add(j)
            if parent is not None and parent not in marked:
                marked.add(parent)
                stack.append(parent)
    return PruneResult(surviving, complete=True, n_states=len(parents))


def _entries_to_map(entries: frozenset) -> dict[str, str]:
    out: dict[str, str] = {}
    for e in entries:
        qe, edge = e.split("##", 1)
        out[qe] = edge
    return out


def surviving_feature_keys(
    features: list[LECFeature], result: PruneResult
) -> set[tuple[int, int, tuple[str, ...]]]:
    """(frag, sign, cmap) keys of surviving features, for filtering PMs."""
    return {
        (features[i].frag, features[i].sign, features[i].cmap)
        for i in result.surviving
    }
