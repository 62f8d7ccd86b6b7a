"""Pure-python reference implementations used as test oracles.

``ref_assemble`` is a direct, string-level de Bruijn assembler mirroring
the paper's round-1 semantics (no error correction): canonical
(k+1)-mers → normalized adjacency → unambiguous-path contigs. It is
deliberately written at the string level (no bit packing, no Spark) so
it fails independently from the distributed implementation.
"""
from __future__ import annotations

from collections import Counter, defaultdict

from repro.dna.codec import canonical, revcomp


def ref_k1mers(reads: list[str], k: int, theta: int = 0) -> Counter:
    """Canonical (k+1)-mer counts over reads (split at N)."""
    c: Counter = Counter()
    for r in reads:
        for frag in r.split("N"):
            for i in range(len(frag) - k):
                c[canonical(frag[i : i + k + 1])[0]] += 1
    return Counter({m: n for m, n in c.items() if n > theta})


def ref_adjacency(k1mers: dict[str, int], k: int):
    """vertex → list of normalized items (nb, dir, lab, cov)."""
    adj: dict[str, list] = defaultdict(list)
    for m, cov in k1mers.items():
        p, s = m[:k], m[1:]
        cp, x = canonical(p)
        cs, y = canonical(s)
        if x == 0:
            adj[cp].append((cs, 1, y, cov))
        else:
            adj[cp].append((cs, 0, 1 - y, cov))
        if y == 0:
            adj[cs].append((cp, 0, x, cov))
        else:
            adj[cs].append((cp, 1, 1 - x, cov))
    return adj


def ref_types(adj: dict[str, list]) -> dict[str, str]:
    types = {}
    for v, items in adj.items():
        if any(it[0] == v for it in items):
            types[v] = "mn"
        elif len(items) == 1:
            types[v] = "1"
        elif len(items) == 2 and {items[0][1], items[1][1]} == {0, 1}:
            types[v] = "11"
        else:
            types[v] = "mn"
    return types


def ref_assemble(reads: list[str], k: int, theta: int = 0) -> list[str]:
    """Round-1 contigs (canonical form, deduplicated), incl. cycles."""
    k1 = ref_k1mers(reads, k, theta)
    adj = ref_adjacency(k1, k)
    types = ref_types(adj)
    unamb = {v for v, t in types.items() if t in ("1", "11")}

    def internal(v):
        return [it for it in adj[v] if it[0] in unamb]

    visited: set[str] = set()
    contigs: list[str] = []

    def walk(start, exit_it):
        """Traverse from ``start`` exiting via ``exit_it``; returns the
        ordered (vertex, orientation) list (orientation 1 = forward)."""
        o = 1 if (exit_it is None or exit_it[1] == 1) else 0
        order = [(start, o)]
        cur, ex = start, exit_it
        while ex is not None:
            nxt = ex[0]
            if nxt == start or nxt in {v for v, _ in order}:
                break  # cycle closed
            d_ent = (1 - ex[1]) if ex[2] == 0 else ex[1]
            o_nxt = 1 if d_ent == 0 else 0
            ent = None
            for e in internal(nxt):
                if e[0] == cur and e[1] == d_ent and e[2] == ex[2]:
                    ent = e
                    break
            others = [e for e in internal(nxt) if e is not ent]
            order.append((nxt, o_nxt))
            cur, ex = nxt, (others[0] if others else None)
        return order

    def stitch(order):
        out = ""
        for i, (v, o) in enumerate(order):
            s = v if o == 1 else revcomp(v)
            out = s if i == 0 else out + s[k - 1 :]
        return out

    # paths (from ends), then leftover cycles
    for v in sorted(unamb):
        if v in visited or len(internal(v)) > 1:
            continue
        ints = internal(v)
        order = walk(v, ints[0] if ints else None)
        for u, _ in order:
            visited.add(u)
        contigs.append(stitch(order))
    for v in sorted(unamb):
        if v in visited:
            continue
        order = walk(v, internal(v)[0])
        for u, _ in order:
            visited.add(u)
        contigs.append(stitch(order))
    return sorted(canonical(c)[0] for c in contigs)
