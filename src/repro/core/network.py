"""Bayesian network structure: DAG, user-interaction ops, partitioning.

The network produced by ``structure.learn_skeleton`` is wrapped in
``BayesianNetwork``, which supports the user-interaction operations of
§4 (add edge, remove edge, merge nodes) and the Markov-blanket
partitioning of §6.1 used by the PI/PIP inference variants.

Nodes are attributes; a *merged* node (paper Fig. 2 (g)–(h)) is a
composite of several attributes and its value in a tuple is the tuple
of member values. Merged nodes participate as evidence (parents or
children of an inferred node); inferring the members of a merged node
individually is out of scope for the cleaner (see DESIGN.md) — the
paper's user study only exercises add/remove-edge edits.

Every mutating operation validates acyclicity and returns the set of
node names whose CPTs must be re-estimated, matching the paper's "we
only recalculate the CPTs for the attributes involved in the
modification".
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Sequence

__all__ = ["BayesianNetwork", "CycleError"]


class CycleError(ValueError):
    """Raised when an edge insertion would create a directed cycle."""


@dataclass(frozen=True)
class _Node:
    name: str
    members: tuple[str, ...]


@dataclass
class BayesianNetwork:
    """A DAG over attribute nodes with parent lists."""

    _nodes: dict[str, _Node] = field(default_factory=dict)
    _parents: dict[str, list[str]] = field(default_factory=dict)

    @classmethod
    def from_parents(cls, parents: dict[str, list[str]]) -> "BayesianNetwork":
        bn = cls()
        for a in parents:
            bn._nodes[a] = _Node(a, (a,))
            bn._parents[a] = []
        for a, ps in parents.items():
            for p in ps:
                bn.add_edge(p, a)
        return bn

    # ------------------------------------------------------------------
    # introspection
    # ------------------------------------------------------------------
    def nodes(self) -> list[str]:
        return list(self._nodes)

    def members(self, v: str) -> tuple[str, ...]:
        """Underlying attribute columns of node ``v`` (itself if simple)."""
        return self._nodes[v].members

    def is_merged(self, v: str) -> bool:
        return len(self._nodes[v].members) > 1

    def parents(self, v: str) -> list[str]:
        return list(self._parents[v])

    def children(self, v: str) -> list[str]:
        return [c for c, ps in self._parents.items() if v in ps]

    def edges(self) -> list[tuple[str, str]]:
        return [(p, c) for c, ps in self._parents.items() for p in ps]

    def markov_blanket(self, v: str) -> set[str]:
        """Parents ∪ children ∪ co-parents of v (standard blanket)."""
        ch = self.children(v)
        out = set(self._parents[v]) | set(ch)
        for c in ch:
            out |= set(self._parents[c])
        out.discard(v)
        return out

    def subnetwork(self, v: str) -> set[str]:
        """§6.1: A_joint = A_parent ∪ {v} ∪ A_child (one-hop neighborhood)."""
        return set(self._parents[v]) | {v} | set(self.children(v))

    def partition(self) -> dict[str, set[str]]:
        """§6.1 BN partitioning: one sub-network per node. Isolated nodes
        map to a singleton set (their CPT is the uniform/prior model)."""
        return {v: self.subnetwork(v) for v in self._nodes}

    def isolated_nodes(self) -> set[str]:
        return {v for v in self._nodes
                if not self._parents[v] and not self.children(v)}

    def topo_order(self) -> list[str]:
        indeg = {v: len(ps) for v, ps in self._parents.items()}
        frontier = sorted(v for v, d in indeg.items() if d == 0)
        order: list[str] = []
        while frontier:
            v = frontier.pop(0)
            order.append(v)
            for c in sorted(self.children(v)):
                indeg[c] -= 1
                if indeg[c] == 0:
                    frontier.append(c)
        if len(order) != len(self._nodes):
            raise CycleError("graph contains a cycle")
        return order

    def _reaches(self, src: str, dst: str) -> bool:
        stack, seen = [src], set()
        while stack:
            v = stack.pop()
            if v == dst:
                return True
            if v in seen:
                continue
            seen.add(v)
            stack.extend(self.children(v))
        return False

    # ------------------------------------------------------------------
    # user-interaction operations (§4)
    # ------------------------------------------------------------------
    def add_edge(self, u: str, v: str) -> set[str]:
        """Add u → v; returns nodes whose CPTs changed. Rejects cycles."""
        if u not in self._nodes or v not in self._nodes:
            raise KeyError(f"unknown node in edge ({u}, {v})")
        if u == v:
            raise CycleError("self-loop")
        if u in self._parents[v]:
            return set()
        if self._reaches(v, u):
            raise CycleError(f"edge ({u}, {v}) would create a cycle")
        self._parents[v].append(u)
        return {v}

    def ensure_edge(self, u: str, v: str) -> set[str]:
        """Lenient user edit: make u → v hold, removing auto-learned
        edges along any v ⇝ u path first (a user inspecting the graph
        would untangle the conflicting direction before adding)."""
        affected: set[str] = set()
        guard = 0
        while self._reaches(v, u):
            path = self._find_path(v, u)
            p, c = path[-2], path[-1]
            affected |= self.remove_edge(p, c)
            guard += 1
            if guard > len(self._nodes) ** 2:  # pragma: no cover
                raise CycleError("could not untangle reverse paths")
        affected |= self.add_edge(u, v)
        return affected

    def _find_path(self, src: str, dst: str) -> list[str]:
        stack: list[list[str]] = [[src]]
        seen: set[str] = set()
        while stack:
            path = stack.pop()
            v = path[-1]
            if v == dst:
                return path
            if v in seen:
                continue
            seen.add(v)
            for c in self.children(v):
                stack.append(path + [c])
        raise KeyError(f"no path {src} -> {dst}")

    def remove_edge(self, u: str, v: str) -> set[str]:
        if u in self._parents.get(v, []):
            self._parents[v].remove(u)
            return {v}
        return set()

    def merge_nodes(self, names: Sequence[str], new_name: str) -> set[str]:
        """Merge nodes per §4: edges shared by *all* merged nodes to/from
        some node A_j collapse into one edge; other edges of the merged
        nodes are dropped. Returns nodes needing CPT refresh."""
        names = list(names)
        if len(names) < 2:
            raise ValueError("need at least two nodes to merge")
        for n in names:
            if n not in self._nodes:
                raise KeyError(n)
        if new_name in self._nodes:
            raise ValueError(f"node {new_name} already exists")
        others = [v for v in self._nodes if v not in names]
        # Shared incoming/outgoing neighbors survive the merge.
        shared_in = [a for a in others
                     if all(a in self._parents[n] for n in names)]
        shared_out = [a for a in others
                      if all(n in self._parents[a] for n in names)]
        members = tuple(m for n in names for m in self._nodes[n].members)
        affected: set[str] = {new_name}
        for a in others:
            before = list(self._parents[a])
            self._parents[a] = [p for p in self._parents[a] if p not in names]
            if self._parents[a] != before:
                affected.add(a)
        for n in names:
            del self._parents[n]
            del self._nodes[n]
        self._nodes[new_name] = _Node(new_name, members)
        self._parents[new_name] = list(shared_in)
        for a in shared_out:
            self._parents[a].append(new_name)
            affected.add(a)
        self.topo_order()  # sanity: still a DAG
        return affected

    def apply_edits(self, edits: Iterable[tuple]) -> set[str]:
        """Apply a batch of user edits: ("add", u, v) / ("remove", u, v) /
        ("merge", [names...], new_name). Returns all affected nodes."""
        affected: set[str] = set()
        for edit in edits:
            op = edit[0]
            if op == "add":
                affected |= self.ensure_edge(edit[1], edit[2])
            elif op == "remove":
                affected |= self.remove_edge(edit[1], edit[2])
            elif op == "merge":
                affected |= self.merge_nodes(edit[1], edit[2])
            else:
                raise ValueError(f"unknown edit op {op!r}")
        return affected

    def copy(self) -> "BayesianNetwork":
        bn = BayesianNetwork()
        bn._nodes = dict(self._nodes)
        bn._parents = {v: list(ps) for v, ps in self._parents.items()}
        return bn
