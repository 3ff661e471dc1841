"""TRIC / TRIC+ — the paper's contribution (§4).

Indexing (§4.1): each query is decomposed into covering paths, which are
clustered into the :class:`~repro.core.trie.TrieForest`; shared path
prefixes across queries share trie nodes and therefore share materialized
views and join work.

Answering (§4.2): for update ``u``, the affected tries come from ``edgeInd``;
each is traversed top-down computing *delta* views semi-naively:

    Δ(child) = Δ(parent) ⋈ base[child.sig]  ∪  old(parent) ⋈ {u}

(the second term only where the child's signature matches ``u``).  Sub-tries
with an empty delta and no matching signature below are pruned.  Queries
registered at nodes that received deltas are assembled via the shared
:class:`~repro.engine.assembler.QueryAssembler` (final join across covering
paths).  ``cached=True`` gives TRIC+: all views keep their hash-join build
structures (indexes) incrementally instead of rebuilding them per join.
"""
from __future__ import annotations

from repro.engine.assembler import AssemblyOverflow, QueryAssembler
from repro.engine.base import Engine, EngineOverflow
from repro.core.trie import TrieForest, TrieNode
from repro.graph.covering import covering_paths
from repro.graph.model import EdgeSig, QueryPattern, Triple, update_sigs
from repro.relational.relation import COUNTERS, Row, View, hash_join


class TricEngine(Engine):
    """Algorithm TRIC (``cached=False``) / TRIC+ (``cached=True``)."""

    def __init__(self, cached: bool = False, max_rows: int = 2_000_000):
        self.cached = cached
        self.name = "tric+" if cached else "tric"
        self.max_rows = max_rows
        self.forest = TrieForest(cached)
        #: base materialized view per edge signature (matV[e_i], §4.1)
        self.base: dict[EdgeSig, View] = {}
        self.assemblers: dict[int, QueryAssembler] = {}
        self.n_queries = 0

    # -- indexing phase -------------------------------------------------
    def add_query(self, q: QueryPattern) -> None:
        q.validate()
        paths = covering_paths(q)
        for pidx, p in enumerate(paths):
            self.forest.insert_path(q, pidx, p)
            for sig in p.sig_chain(q):
                if sig not in self.base:
                    self.base[sig] = View(arity=2, cached=self.cached)
        self.assemblers[q.qid] = QueryAssembler(q, paths, self.cached, self.max_rows)
        self.n_queries += 1

    # -- answering phase ------------------------------------------------
    def process_update(self, u: Triple) -> list[int]:
        sigs = [s for s in update_sigs(u) if s in self.base]
        if not sigs:
            return []
        row: Row = (u.s, u.o)
        # update base views first: trie deltas join against base *including* u
        for sig in sigs:
            self.base[sig].add(row)
        sig_set = set(sigs)

        affected: set[int] = set()
        try:
            for root in self.forest.affected_roots(sigs):
                root_delta: list[Row] = []
                if root.sig in sig_set:
                    root_delta = root.matv.add_all([row])
                self._descend(root, root_delta, sig_set, affected, row)
            out = [qid for qid in sorted(affected) if self.assemblers[qid].finish_update()]
        except AssemblyOverflow as e:
            raise EngineOverflow(str(e)) from e
        return out

    def _descend(
        self,
        node: TrieNode,
        delta: list[Row],
        sig_set: set[EdgeSig],
        affected: set[int],
        u_row: Row,
    ) -> None:
        if delta and node.registered:
            for qid, pidx in node.registered:
                self.assemblers[qid].on_path_delta(pidx, delta)
                affected.add(qid)
        for child in node.children.values():
            # pruning: nothing below can change
            if not delta and not (sig_set & child.subtree_sigs):
                continue
            child_rows: list[Row] = []
            if delta:
                last = node.depth + 1
                child_rows.extend(
                    hash_join(
                        delta,
                        (last,),
                        self.base[child.sig],
                        (0,),
                        lambda pr, br: pr + (br[1],),
                    )
                )
            if child.sig in sig_set:
                # old(parent) ⋈ {u}: parent rows (minus this update's delta)
                # whose last slot equals u's source
                u_s, u_o = u_row
                old_stop = len(node.matv.rows) - len(delta)
                last = node.depth + 1
                idx = node.matv.index((last,)) if self.cached else None
                if idx is not None:
                    COUNTERS["probe_rows"] += 1
                    dset = set(delta)
                    for pr in idx.get((u_s,)):
                        if pr not in dset:
                            child_rows.append(pr + (u_o,))
                else:
                    # uncached: the build phase scans the whole parent view
                    # on every call (§4.2 Caching — this is what TRIC+ saves)
                    COUNTERS["build_rows"] += old_stop
                    rows = node.matv.rows
                    for i in range(old_stop):
                        pr = rows[i]
                        if pr[last] == u_s:
                            child_rows.append(pr + (u_o,))
            child_delta = child.matv.add_all(child_rows) if child_rows else []
            if child_delta or (sig_set & child.subtree_sigs):
                self._descend(child, child_delta, sig_set, affected, u_row)
