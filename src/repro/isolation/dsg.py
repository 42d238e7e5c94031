"""Direct Serialization Graphs with derivation-extended dependencies (§4).

The three dependency kinds, each with its prior (Adya) definition **or** the
paper's derivation extension:

- **wr** (item-read-depends): Ti installs x_i and Tj reads x_i; *or* Ti
  installs y_k, Tj reads x_i, and x_i derives from y_k.
- **rw** (item-anti-depends): Ti reads x_k and Tj installs x's next version;
  *or* Ti reads x_k, x_k derives from y_m, and Tj installs y's next version.
- **ww** (write-depends): Ti installs x_i and Tj installs x's next version;
  *or* Ti installs x_i, Tj installs y_j, and consecutive versions z_k ≪ z_m
  exist with z_k deriving from x_i and z_m deriving from y_j.

Derivations themselves are *transparent*: they connect readers to the
transactions that wrote the base values (Theorem 1 — dependencies are
agnostic to which transaction contains the derivation), so pure-refresh
transactions drop out of the DSG exactly as in the paper's Figure 2. Edges
touching transactions that consist solely of derivations are omitted.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.isolation.history import Derive, History, Read, Write


@dataclass(frozen=True)
class Edge:
    src: str
    dst: str
    kind: str  # 'ww' | 'wr' | 'rw'


@dataclass
class DSG:
    nodes: list[str]
    edges: set[Edge]

    def edges_of_kinds(self, kinds: set[str]) -> set[Edge]:
        return {e for e in self.edges if e.kind in kinds}

    def has_cycle(self, kinds: set[str] | None = None) -> bool:
        """True if a cycle exists using only edges of the given kinds."""
        edges = self.edges if kinds is None else self.edges_of_kinds(kinds)
        adj: dict[str, set[str]] = {n: set() for n in self.nodes}
        for e in edges:
            if e.src in adj:
                adj[e.src].add(e.dst)
        WHITE, GREY, BLACK = 0, 1, 2
        color = {n: WHITE for n in self.nodes}

        def dfs(n: str) -> bool:
            color[n] = GREY
            for m in adj.get(n, ()):
                if color.get(m, WHITE) == GREY:
                    return True
                if color.get(m, WHITE) == WHITE and dfs(m):
                    return True
            color[n] = BLACK
            return False

        return any(color[n] == WHITE and dfs(n) for n in self.nodes)


def _derivation_only_txns(h: History) -> set[str]:
    """Transactions whose data operations are exclusively derivations — DT
    refresh transactions ("all DT refreshes consist exclusively of derivation
    operations"). They vanish from the DSG."""
    ops: dict[str, list] = {}
    for e in h.events:
        if isinstance(e, (Read, Write, Derive)):
            ops.setdefault(e.txn, []).append(e)
    return {
        t
        for t, es in ops.items()
        if es and all(isinstance(x, Derive) for x in es)
    }


def build_dsg(h: History, *, include_aborted: bool = False) -> DSG:
    """Construct the derivation-extended DSG of a history."""
    hidden = _derivation_only_txns(h)
    with_data_ops = {
        e.txn for e in h.events if isinstance(e, (Read, Write, Derive))
    }
    consider = (set(h.txns) & with_data_ops) - hidden
    if not include_aborted:
        consider -= h.aborted()
    edges: set[Edge] = set()

    def add(src: str | None, dst: str | None, kind: str) -> None:
        if src is None or dst is None or src == dst:
            return
        if src in consider and dst in consider:
            edges.add(Edge(src, dst, kind))

    reads = [e for e in h.events if isinstance(e, Read)]
    installs = [e for e in h.events if isinstance(e, (Write, Derive))]

    # wr: connect each read to the writers of the value's base versions.
    for r in reads:
        for (obj, ver) in h.base_writers_of(r.obj, r.version):
            add(h.installer(obj, ver), r.txn, "wr")

    # rw: reader of x_k (or of a value deriving from y_m) vs installer of the
    # next version of the base object.
    for r in reads:
        for (obj, ver) in h.base_writers_of(r.obj, r.version):
            nxt = h.next_version(obj, ver)
            if nxt is not None:
                add(r.txn, h.installer(obj, nxt), "rw")

    # ww, prior definition: consecutive installed versions of the same object.
    for e in installs:
        nxt = h.next_version(e.obj, e.version)
        if nxt is not None:
            add(e.txn, h.installer(e.obj, nxt), "ww")

    # ww, derivation extension: consecutive derived versions z_k << z_m whose
    # bases were written by Ti and Tj induce Ti -ww-> Tj.
    for e in installs:
        if not isinstance(e, Derive):
            continue
        nxt = h.next_version(e.obj, e.version)
        if nxt is None or h.derivation(e.obj, nxt) is None:
            continue
        for (o1, v1) in h.base_writers_of(e.obj, e.version):
            for (o2, v2) in h.base_writers_of(e.obj, nxt):
                if (o1, v1) != (o2, v2):
                    add(h.installer(o1, v1), h.installer(o2, v2), "ww")

    nodes = sorted(consider)
    return DSG(nodes=nodes, edges=edges)
