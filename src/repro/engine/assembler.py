"""Per-query final join across covering paths (paper Fig. 9, lines 8–13).

Every engine decomposes queries into covering paths and materializes path
matches somehow (TRIC: shared trie views; INC: per-query increments; INV:
full recomputation; the graph DB bypasses this module).  What is common is
the last step: when a path receives *new* matches, join them with the other
paths' matches **on the query vertices the paths share** ("intersection"
information, §4.1) to decide whether new full-query embeddings appeared.

The assembler keeps, per covering path, a *canonical* view: slot tuples
projected to the path's distinct variable vertices (literal slots carry no
information — their values are fixed by the edge signatures), after checking
within-path consistency of repeated vertices (this is where a cycle's
closure constraint is enforced, since tries index paths obliviously to it).

Paths are grouped into variable-connected components; a component is
*satisfied* monotonically once a cross-path join over it succeeds.  A new
full-query embedding exists after an update iff some component had a
successful delta join this update and all components are satisfied.
"""
from __future__ import annotations

from repro.graph.covering import CoverPath
from repro.graph.model import QueryPattern
from repro.relational.relation import Row, View, hash_join


class AssemblyOverflow(RuntimeError):
    """Cross-path join exceeded the configured row cap."""


class QueryAssembler:
    """Final-join state machine for one indexed query."""

    def __init__(
        self,
        q: QueryPattern,
        paths: list[CoverPath],
        cached: bool,
        max_rows: int = 2_000_000,
    ):
        self.q = q
        self.paths = paths
        self.cached = cached
        self.max_rows = max_rows

        # per path: ordered distinct variable vids + their slot positions
        self.path_vars: list[tuple[int, ...]] = []
        self._var_positions: list[dict[int, list[int]]] = []
        for p in paths:
            order: list[int] = []
            pos: dict[int, list[int]] = {}
            for i, vid in enumerate(p.slots):
                if q.vertices[vid] is not None:
                    continue  # literal slot: value fixed by signature
                if vid not in pos:
                    pos[vid] = []
                    order.append(vid)
                pos[vid].append(i)
            self.path_vars.append(tuple(order))
            self._var_positions.append(pos)

        self.canon_views = [
            View(arity=len(v), cached=cached) for v in self.path_vars
        ]

        # variable-connected components of paths (union-find)
        parent = list(range(len(paths)))

        def find(x: int) -> int:
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        var_owner: dict[int, int] = {}
        for i, vs in enumerate(self.path_vars):
            for v in vs:
                if v in var_owner:
                    parent[find(i)] = find(var_owner[v])
                else:
                    var_owner[v] = i
        self.path_comp = [find(i) for i in range(len(paths))]
        self.components = sorted(set(self.path_comp))
        self.comp_satisfied: dict[int, bool] = {c: False for c in self.components}

        self._pending: dict[int, list[Row]] = {}

    # ------------------------------------------------------------------
    def canon(self, pidx: int, slot_rows: list[Row]) -> list[Row]:
        """Project slot tuples to the path's variable bindings, dropping rows
        whose repeated-vertex positions disagree (cycle closure)."""
        pos = self._var_positions[pidx]
        order = self.path_vars[pidx]
        out: list[Row] = []
        for r in slot_rows:
            ok = True
            vals = []
            for v in order:
                ps = pos[v]
                val = r[ps[0]]
                for extra in ps[1:]:
                    if r[extra] != val:
                        ok = False
                        break
                if not ok:
                    break
                vals.append(val)
            if ok:
                out.append(tuple(vals))
        return out

    def on_path_delta(self, pidx: int, slot_rows: list[Row]) -> None:
        """Feed newly materialized slot tuples for one covering path."""
        if not slot_rows:
            return
        new = self.canon_views[pidx].add_all(self.canon(pidx, slot_rows))
        if new:
            self._pending.setdefault(pidx, []).extend(new)

    def finish_update(self) -> bool:
        """Close the update: returns True iff new full-query embeddings exist."""
        if not self._pending:
            return False
        delta_success = False
        for pidx, delta in self._pending.items():
            comp = self.path_comp[pidx]
            if self._component_delta_join(pidx, delta):
                self.comp_satisfied[comp] = True
                delta_success = True
        self._pending.clear()
        return delta_success and all(self.comp_satisfied.values())

    # ------------------------------------------------------------------
    def full_join_rows(self) -> int:
        """Full (non-delta) cross-path join over all canonical views — the
        final-join work INV and INC perform per affected query (paper §5.1
        Step 3: "performs the final join operation among all the paths").

        Joins run per variable-connected component (cross-component products
        are not materialized); returns the number of result rows computed.
        Raises :class:`AssemblyOverflow` past ``max_rows`` — the row-cap
        analogue of the paper's execution-time threshold.
        """
        total = 0
        for comp in self.components:
            members = [j for j in range(len(self.paths)) if self.path_comp[j] == comp]
            if any(len(self.canon_views[j]) == 0 for j in members):
                continue  # pruned: some path still unmatched
            first = min(members, key=lambda j: len(self.canon_views[j]))
            acc = list(self.canon_views[first].rows)
            acc_vars = list(self.path_vars[first])
            remaining = set(members) - {first}
            while remaining and acc:
                cands = [
                    j for j in remaining if any(v in acc_vars for v in self.path_vars[j])
                ]
                j = min(cands, key=lambda x: len(self.canon_views[x]))
                shared = [v for v in self.path_vars[j] if v in acc_vars]
                probe_key = tuple(acc_vars.index(v) for v in shared)
                build_key = tuple(self.path_vars[j].index(v) for v in shared)
                new_cols = tuple(
                    i for i, v in enumerate(self.path_vars[j]) if v not in acc_vars
                )

                def emit(pr: Row, br: Row, cols=new_cols) -> Row:
                    return pr + tuple(br[c] for c in cols)

                acc = hash_join(acc, probe_key, self.canon_views[j], build_key, emit)
                if len(acc) > self.max_rows:
                    raise AssemblyOverflow(
                        f"Q{self.q.qid}: full final join exceeded {self.max_rows} rows"
                    )
                acc_vars += [self.path_vars[j][c] for c in new_cols]
                remaining.discard(j)
            total += len(acc)
        return total

    def _component_delta_join(self, pidx: int, delta: list[Row]) -> bool:
        comp = self.path_comp[pidx]
        others = [
            j
            for j in range(len(self.paths))
            if self.path_comp[j] == comp and j != pidx
        ]
        # fast bail: a component partner with no matches yet kills the join
        if any(len(self.canon_views[j]) == 0 for j in others):
            return False
        acc = delta
        acc_vars = list(self.path_vars[pidx])
        remaining = set(others)
        while remaining:
            # next path sharing a variable with the accumulator (exists by
            # construction of components); prefer the smallest view
            cands = [
                j
                for j in remaining
                if any(v in acc_vars for v in self.path_vars[j])
            ]
            j = min(cands, key=lambda x: len(self.canon_views[x]))
            shared = [v for v in self.path_vars[j] if v in acc_vars]
            probe_key = tuple(acc_vars.index(v) for v in shared)
            build_key = tuple(self.path_vars[j].index(v) for v in shared)
            new_cols = [
                i for i, v in enumerate(self.path_vars[j]) if v not in acc_vars
            ]

            def emit(pr: Row, br: Row, cols=tuple(new_cols)) -> Row:
                return pr + tuple(br[c] for c in cols)

            acc = hash_join(acc, probe_key, self.canon_views[j], build_key, emit)
            if not acc:
                return False
            if len(acc) > self.max_rows:
                raise AssemblyOverflow(
                    f"Q{self.q.qid}: cross-path join exceeded {self.max_rows} rows"
                )
            acc_vars += [self.path_vars[j][c] for c in new_cols]
            remaining.discard(j)
        return True
