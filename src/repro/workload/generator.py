"""Random query generator over the IR.

Reproduces the paper's level-4 test infrastructure (§6.1): "a framework that
generates random SQL queries allows us to test the correctness of hundreds of
thousands of different DTs". Every generated plan

- is valid over the standard test tables (``t_orders``/``t_lines``/``t_cust``),
- renders to DuckDB SQL via :func:`repro.core.compile.to_sql` with identical
  semantics (deterministic expressions only — no tie-broken ranks),
- has globally unique output column names, so joins/unions always compose.

``OPERATOR_MIX`` approximates the Fig. 6 operator-frequency distribution and
drives both the generator and the T3 coverage experiment.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core import plan as P

#: Approximate Fig. 6 frequencies (probability an operator class appears in a
#: DT definition). Read off the paper's figure: projections/filters nearly
#: universal, joins and aggregates common, the unsupported tail small.
OPERATOR_MIX: dict[str, float] = {
    "project": 0.95,
    "filter": 0.70,
    "join_inner": 0.45,
    "join_outer": 0.15,
    "aggregate": 0.40,
    "union_all": 0.10,
    "distinct": 0.10,
    "window": 0.10,
    "flatten": 0.05,
    # outside incremental coverage (§3.3.2)
    "scalar_aggregate": 0.10,
    "in_subquery": 0.08,
    "scalar_subquery": 0.07,
}


@dataclass
class Col:
    """A typed output column of a relation under construction."""

    name: str
    kind: str  # 'int' | 'float' | 'str'


@dataclass
class Rel:
    """A plan plus its typed output columns."""

    plan: P.Plan
    cols: list[Col]

    def of_kind(self, kind: str) -> list[Col]:
        return [c for c in self.cols if c.kind == kind]


_BASE = {
    "t_orders": [
        Col("o_ok", "int"),
        Col("o_ck", "int"),
        Col("o_price", "float"),
        Col("o_status", "str"),
    ],
    "t_lines": [Col("l_ok", "int"), Col("l_pk", "int"), Col("l_qty", "float")],
    "t_cust": [Col("c_ck", "int"), Col("c_seg", "str")],
}


class QueryGenerator:
    """Generates random, always-valid DT defining queries."""

    def __init__(self, seed: int = 0, mix: dict[str, float] | None = None) -> None:
        self.rng = np.random.default_rng(seed)
        self.mix = dict(OPERATOR_MIX if mix is None else mix)
        self._sym = 0

    # -- helpers ---------------------------------------------------------
    def _gensym(self, base: str) -> str:
        self._sym += 1
        return f"{base}_{self._sym}"

    def _maybe(self, op: str) -> bool:
        return self.rng.random() < self.mix.get(op, 0.0)

    def _scan(self) -> Rel:
        """A base-table scan wrapped in a renaming Project so every relation
        has globally unique column names (joins never collide)."""
        table = str(self.rng.choice(list(_BASE)))
        cols = _BASE[table]
        renamed = [Col(self._gensym(c.name), c.kind) for c in cols]
        plan = P.Project(P.Scan(table), tuple((r.name, c.name) for r, c in zip(renamed, cols)))
        return Rel(plan, renamed)

    def _predicate(self, rel: Rel) -> str | None:
        cands = []
        for c in rel.of_kind("int"):
            cands.append(f"{c.name} % {int(self.rng.integers(2, 5))} != 0")
            cands.append(f"{c.name} > {int(self.rng.integers(1, 20))}")
        for c in rel.of_kind("float"):
            cands.append(f"{c.name} > {float(self.rng.integers(1, 500))}")
        for c in rel.of_kind("str"):
            cands.append(f"{c.name} <> 'Z'")
            cands.append(f"{c.name} IN ('O', 'F', 'A', 'B')")
        if not cands:
            return None
        return str(self.rng.choice(cands))

    # -- operator applications ------------------------------------------
    def _apply_filter(self, rel: Rel) -> Rel:
        pred = self._predicate(rel)
        return Rel(P.Filter(rel.plan, pred), rel.cols) if pred else rel

    def _apply_project(self, rel: Rel) -> Rel:
        keep = [c for c in rel.cols if self.rng.random() < 0.8] or rel.cols[:1]
        exprs = [(c.name, c.name) for c in keep]
        out = list(keep)
        floats = rel.of_kind("float")
        if floats and self.rng.random() < 0.5:
            f = floats[0]
            nm = self._gensym("calc")
            exprs.append((nm, f"{f.name} * 1.1 + 1"))
            out.append(Col(nm, "float"))
        return Rel(P.Project(rel.plan, tuple(exprs)), out)

    def _apply_join(self, left: Rel, right: Rel, how: str) -> Rel | None:
        lints, rints = left.of_kind("int"), right.of_kind("int")
        if not lints or not rints:
            return None
        lk = lints[int(self.rng.integers(len(lints)))]
        rk = rints[int(self.rng.integers(len(rints)))]
        plan = P.Join(left.plan, right.plan, (lk.name,), (rk.name,), how)
        return Rel(plan, left.cols + right.cols)

    def _apply_union(self, left: Rel, right: Rel) -> Rel | None:
        li, ri = left.of_kind("int"), right.of_kind("int")
        lf, rf = left.of_kind("float"), right.of_kind("float")
        if not (li and ri and lf and rf):
            return None
        k, v = self._gensym("uk"), self._gensym("uv")
        a = P.Project(left.plan, ((k, li[0].name), (v, lf[0].name)))
        b = P.Project(right.plan, ((k, ri[0].name), (v, rf[0].name)))
        return Rel(P.UnionAll(a, b), [Col(k, "int"), Col(v, "float")])

    def _apply_aggregate(self, rel: Rel, *, scalar: bool = False) -> Rel | None:
        nums = rel.of_kind("float") + rel.of_kind("int")
        if not nums:
            return None
        keys: tuple[str, ...] = ()
        key_cols: list[Col] = []
        if not scalar:
            groupable = rel.of_kind("str") + rel.of_kind("int")
            groupable = [c for c in groupable if c not in nums[:1]]
            if not groupable:
                return None
            nk = 1 if len(groupable) == 1 or self.rng.random() < 0.7 else 2
            picked = list(self.rng.choice(len(groupable), nk, replace=False))
            key_cols = [groupable[i] for i in picked]
            keys = tuple(c.name for c in key_cols)
        v = nums[0]
        aggs = [(self._gensym("cnt"), "count(*)")]
        out = [Col(aggs[0][0], "int")]
        for fn, kind in (("sum", v.kind), ("max", v.kind), ("min", v.kind)):
            if self.rng.random() < 0.5:
                nm = self._gensym(fn)
                aggs.append((nm, f"{fn}({v.name})"))
                out.append(Col(nm, kind))
        return Rel(P.Aggregate(rel.plan, keys, tuple(aggs)), key_cols + out)

    def _apply_distinct(self, rel: Rel) -> Rel | None:
        small = rel.of_kind("str") + rel.of_kind("int")
        if not small:
            return None
        keep = small[: int(self.rng.integers(1, min(3, len(small)) + 1))]
        proj = P.Project(rel.plan, tuple((c.name, c.name) for c in keep))
        return Rel(P.Distinct(proj), keep)

    def _apply_window(self, rel: Rel, *, partitioned: bool = True) -> Rel | None:
        parts = rel.of_kind("str") + rel.of_kind("int")
        nums = rel.of_kind("float") + rel.of_kind("int")
        if not nums or (partitioned and not parts):
            return None
        v = nums[0]
        nm = self._gensym("w")
        if partitioned:
            k = parts[int(self.rng.integers(len(parts)))]
            # unordered partition frame: deterministic (no tie-break hazard)
            expr = f"sum({v.name}) OVER (PARTITION BY {k.name})"
            plan = P.Window(rel.plan, (k.name,), ((nm, expr),))
        else:
            expr = f"sum({v.name}) OVER ()"
            plan = P.Window(rel.plan, (), ((nm, expr),))
        return Rel(plan, rel.cols + [Col(nm, "float")])

    def _apply_in_subquery(self, rel: Rel) -> Rel | None:
        ints = rel.of_kind("int")
        if not ints:
            return None
        sub = self._scan()
        sints = sub.of_kind("int")
        if not sints:
            return None
        plan = P.InSubqueryFilter(rel.plan, ints[0].name, sub.plan, sints[0].name)
        return Rel(plan, rel.cols)

    def _apply_scalar_subquery(self, rel: Rel) -> Rel | None:
        floats = rel.of_kind("float")
        if not floats:
            return None
        sub = self._scan()
        sfloats = sub.of_kind("float")
        if not sfloats:
            return None
        plan = P.ScalarSubqueryFilter(
            rel.plan, floats[0].name, ">", sub.plan, f"avg({sfloats[0].name})"
        )
        return Rel(plan, rel.cols)

    # -- entry point ----------------------------------------------------
    def random_plan(self, *, allow_unsupported: bool = False) -> P.Plan:
        """One random DT defining query sampled from the operator mix."""
        rel = self._scan()
        rel = self._apply_filter(rel) if self._maybe("filter") else rel

        if self._maybe("join_inner") or self._maybe("join_outer"):
            how = "inner"
            if self._maybe("join_outer"):
                how = str(self.rng.choice(["left", "right", "full"]))
            other = self._scan()
            if self.rng.random() < 0.3:
                other = self._apply_filter(other)
            joined = self._apply_join(rel, other, how)
            rel = joined or rel

        if self._maybe("union_all"):
            other = self._scan()
            u = self._apply_union(rel, other)
            rel = u or rel

        if allow_unsupported and self._maybe("in_subquery"):
            rel = self._apply_in_subquery(rel) or rel
        if allow_unsupported and self._maybe("scalar_subquery"):
            rel = self._apply_scalar_subquery(rel) or rel

        did_agg = False
        if allow_unsupported and self._maybe("scalar_aggregate"):
            agg = self._apply_aggregate(rel, scalar=True)
            if agg:
                rel, did_agg = agg, True
        elif self._maybe("aggregate"):
            agg = self._apply_aggregate(rel)
            if agg:
                rel, did_agg = agg, True

        if not did_agg and self._maybe("distinct"):
            rel = self._apply_distinct(rel) or rel
        if self._maybe("window"):
            w = self._apply_window(rel)
            rel = w or rel
        if self._maybe("project"):
            rel = self._apply_project(rel)
        return rel.plan


def random_plans(n: int, *, seed: int = 0, allow_unsupported: bool = False) -> list[P.Plan]:
    """``n`` random plans from one seeded generator (distinct symbol pools)."""
    g = QueryGenerator(seed=seed)
    return [g.random_plan(allow_unsupported=allow_unsupported) for _ in range(n)]
