"""Query differentiation: rewrite a defining query Q into Δ_I Q, the query
computing Q's changes over a data-timestamp interval I (§5.5).

The rewrite rules mirror the paper's framework (and its predecessor, the
Snowflake Streams change-query framework [5]):

- **Filter / Project / UnionAll / Flatten** are linear: differentiate the
  child and re-apply the operator (row ids and signs pass through).
- **Inner join** uses the bilinear rule
  ``Δ(Q ⋈ R) = ΔQ ⋈ R|t0  ∪  Q|t1 ⋈ ΔR`` over signed multiplicities;
  exact insert/delete pairs produced by both terms cancel in consolidation.
- **Outer joins** are decomposed into the inner part plus NULL-padded
  anti-join parts — the paper's original formulation
  (``Δ(Q ⟗ R) ⇒ Δ(Q ⋈ R) + Δ(π_{R=NULL}(Q ▷ R))`` §5.5.1). The anti parts
  are maintained by *affected-key recompute*. The paper later replaced this
  with a direct operator for performance; we keep the compositional form and
  reuse compiled subterms via a per-compilation cache (the SPLIT-operator
  term-reuse the paper describes).
- **Grouped aggregation / Distinct** recompute *changed groups*: delete the
  old aggregate rows of affected keys, insert the recomputed ones. Like the
  paper's derivatives, no rule reuses previously stored DT state — changes
  are computed purely from the sources (§5.5.3).
- **Window functions** use the paper's partition-recompute rule
  ``Δ(ξ_k(Q)) ⇒ π_-(ξ_k(Q|t0 ⋉_k ΔQ)) + π_+(ξ_k(Q|t1 ⋉_k ΔQ))``.

Deltas are DataFrames with the query's user columns plus ``__rid__`` and
``__sign__`` (±1). :func:`consolidate_delta` groups by (rid, row values) and
sums signs so the final change set satisfies the framework guarantee of at
most one row per ``($ROW_ID, $ACTION)`` pair.
"""
from __future__ import annotations

from typing import Protocol

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import plan as P
from repro.core.compile import (
    CompileError,
    compile_full,
    compile_join,
    group_rid,
    user_cols,
)
from repro.substrate.versioned_store import RID, SIGN


class UnsupportedIncremental(CompileError):
    """The plan contains an operator outside incremental coverage (§3.3.2)."""


class DeltaResolver(Protocol):
    """Provides versioned scans for the refresh interval ``(t0, t1]``."""

    def scan_old(self, table: str) -> DataFrame: ...
    def scan_new(self, table: str) -> DataFrame: ...
    def scan_delta(self, table: str) -> DataFrame: ...


class _Bound:
    """Adapts a DeltaResolver end ('old'/'new') to the full compiler."""

    def __init__(self, resolver: DeltaResolver, which: str) -> None:
        self._r, self._which = resolver, which

    def scan(self, table: str) -> DataFrame:
        return self._r.scan_old(table) if self._which == "old" else self._r.scan_new(table)


class _Ctx:
    """Compilation context: caches full subplans at each interval end.

    Caching realizes the paper's term reuse (SPLIT): ``Q|t0`` / ``Q|t1``
    appearing in several rules compile once per (node, end).
    """

    def __init__(self, resolver: DeltaResolver) -> None:
        self.resolver = resolver
        self._cache: dict[tuple[int, str], DataFrame] = {}

    def full(self, node: P.Plan, which: str) -> DataFrame:
        key = (id(node), which)
        if key not in self._cache:
            self._cache[key] = compile_full(node, _Bound(self.resolver, which))
        return self._cache[key]


def _localize(df: DataFrame) -> DataFrame:
    """Materialize a (small) change-set DataFrame as a local relation.

    Delta subtrees are referenced several times by the rewrite rules (the
    affected-key extraction, both bilinear join terms, the old/new group
    recomputes). Materializing each intermediate change set once — change
    sets are small by the IVM premise — makes the overall delta evaluation
    linear in the plan instead of exponential in re-evaluations. This is the
    micro-batch analog of Snowflake's SPLIT/term-reuse (§5.5.1).
    """
    spark = df.sparkSession
    pdf = df.toPandas()
    if len(pdf) == 0:
        return spark.createDataFrame([], df.schema)
    # Change sets are the small side of every join they appear in; the
    # broadcast hint is the Spark analog of the paper's delta-side runtime
    # pruning (§5.5.2) — without it the big side gets shuffled per refresh.
    # (The session disables auto-broadcast so *full* plans exercise shuffles;
    # explicit hints on delta frames override that per-query, as intended.)
    return F.broadcast(spark.createDataFrame(pdf, schema=df.schema))


def _semijoin_nullsafe(df: DataFrame, keys_df: DataFrame, on: list[tuple[str, str]]) -> DataFrame:
    """``df ⋉ keys_df`` with NULL-safe key equality (NULL groups are groups)."""
    renamed = keys_df
    for i, (_, kk) in enumerate(on):
        renamed = renamed.withColumnRenamed(kk, f"__sk{i}__")
    renamed = F.broadcast(renamed.select(*[f"__sk{i}__" for i in range(len(on))]).distinct())
    cond = None
    for i, (dk, _) in enumerate(on):
        c = df[dk].eqNullSafe(renamed[f"__sk{i}__"])
        cond = c if cond is None else (cond & c)
    return df.join(renamed, on=cond, how="left_semi")


# ---------------------------------------------------------------------------
# Semijoin pushdown (performance): restrict a full-side compile to rows that
# can possibly belong to affected groups. This is the reproduction's analog
# of the paper's runtime-pruning optimizations (§5.5.2): without it, the
# changed-group recompute of aggregates/windows would re-join the full
# sources on every incremental refresh, erasing the incremental advantage.
# The restriction is best-effort and may overselect; callers apply an exact
# trim at the top, so correctness never depends on the pushdown.
# ---------------------------------------------------------------------------


def _affected_df(d: DataFrame, keys: tuple[str, ...]) -> DataFrame:
    """Distinct affected key tuples, renamed to collision-free columns."""
    return d.select(
        *[F.col(k).alias(f"__sk{i}__") for i, k in enumerate(keys)]
    ).distinct()


def _semijoin_map(df: DataFrame, affected: DataFrame, keymap: dict[str, str]) -> DataFrame:
    """``df ⋉ affected`` on (df column → affected __sk column) pairs."""
    sub = F.broadcast(affected.select(*sorted(set(keymap.values()))).distinct())
    cond = None
    for col, aff in keymap.items():
        c = df[col].eqNullSafe(sub[aff])
        cond = c if cond is None else (cond & c)
    return df.join(sub, on=cond, how="left_semi")


def _compile_restricted(
    node: P.Plan, ctx: _Ctx, which: str, affected: DataFrame, keymap: dict[str, str]
) -> DataFrame:
    """Compile ``node`` at interval end ``which``, pre-restricted to rows
    whose ``keymap`` columns (node outputs → affected columns) match the
    affected key set. Pushes semijoins through Filter, renaming Projects,
    UnionAll, and inner Joins (mapping keys across equi-join equivalence to
    restrict *both* sides). Returns a superset of the affected groups' rows.
    """
    if not keymap:
        return ctx.full(node, which)

    if isinstance(node, P.Filter):
        return _compile_restricted(node.child, ctx, which, affected, keymap).filter(
            F.expr(node.predicate)
        )

    if isinstance(node, P.Project):
        bare = dict(node.exprs)
        child_map = {}
        for out_col, aff in keymap.items():
            e = bare.get(out_col, "")
            if e.strip().isidentifier():
                child_map[e.strip()] = aff
        src = _compile_restricted(node.child, ctx, which, affected, child_map)
        return src.select(*[F.expr(e).alias(n) for n, e in node.exprs], F.col(RID))

    if isinstance(node, P.UnionAll):
        l = _compile_restricted(node.left, ctx, which, affected, keymap)
        r = _compile_restricted(node.right, ctx, which, affected, keymap)
        l = l.withColumn(RID, F.concat(F.lit("u0:"), F.col(RID)))
        r = r.withColumn(RID, F.concat(F.lit("u1:"), F.col(RID)))
        return l.unionByName(r)

    if isinstance(node, P.Join) and node.how == "inner" and node.residual is None:
        l_full = ctx.full(node.left, which)
        r_full = ctx.full(node.right, which)
        l_cols, r_cols = set(user_cols(l_full)), set(user_cols(r_full))
        lmap: dict[str, str] = {}
        rmap: dict[str, str] = {}
        for out_col, aff in keymap.items():
            if out_col in l_cols:
                lmap[out_col] = aff
                if out_col in node.left_on:
                    rmap[node.right_on[node.left_on.index(out_col)]] = aff
            elif out_col in r_cols:
                rmap[out_col] = aff
                if out_col in node.right_on:
                    lmap[node.left_on[node.right_on.index(out_col)]] = aff
        l = _compile_restricted(node.left, ctx, which, affected, lmap)
        r = _compile_restricted(node.right, ctx, which, affected, rmap)
        return compile_join(l, r, node)

    # stop node (scan, aggregate, window, outer join, …): restrict here
    return _semijoin_map(ctx.full(node, which), affected, keymap)


def _null_pad(df: DataFrame, like: DataFrame) -> DataFrame:
    """Add NULL columns (typed from ``like``) for the missing join side."""
    out = df
    for f in like.schema.fields:
        if f.name in (RID, SIGN):
            continue
        out = out.withColumn(f.name, F.lit(None).cast(f.dataType))
    return out


def _anti(l: DataFrame, r: DataFrame, left_on: tuple[str, ...], right_on: tuple[str, ...]) -> DataFrame:
    """Plain-equality anti join (NULL keys never match, as in SQL outer joins)."""
    cond = None
    for lk, rk in zip(left_on, right_on):
        c = l[lk] == r[rk]
        cond = c if cond is None else (cond & c)
    return l.join(r, on=cond, how="left_anti")


def compile_delta(node: P.Plan, resolver: DeltaResolver) -> DataFrame:
    """Compile Δ_I(node): user columns + ``RID`` + ``SIGN`` (unconsolidated)."""
    return _delta(node, _Ctx(resolver))


def _delta(node: P.Plan, ctx: _Ctx) -> DataFrame:
    if isinstance(node, P.Scan):
        return ctx.resolver.scan_delta(node.table)

    if isinstance(node, P.Filter):
        return _delta(node.child, ctx).filter(F.expr(node.predicate))

    if isinstance(node, P.Project):
        d = _delta(node.child, ctx)
        return d.select(*[F.expr(e).alias(n) for n, e in node.exprs], F.col(RID), F.col(SIGN))

    if isinstance(node, P.UnionAll):
        l = _delta(node.left, ctx).withColumn(RID, F.concat(F.lit("u0:"), F.col(RID)))
        r = _delta(node.right, ctx).withColumn(RID, F.concat(F.lit("u1:"), F.col(RID)))
        return l.unionByName(r)

    if isinstance(node, P.Join):
        return _delta_join(node, ctx)

    if isinstance(node, P.Aggregate):
        if not node.keys:
            raise UnsupportedIncremental("scalar aggregates are FULL-refresh only (§3.3.2)")
        return _delta_aggregate(node, ctx)

    if isinstance(node, P.Distinct):
        return _delta_distinct(node, ctx)

    if isinstance(node, P.Window):
        if not node.partition_by:
            raise UnsupportedIncremental("unpartitioned window functions are FULL-refresh only")
        return _delta_window(node, ctx)

    if isinstance(node, P.Flatten):
        d = _delta(node.child, ctx)
        others = [c for c in user_cols(d) if c != node.col]
        out = d.select(
            *others,
            F.col(RID),
            F.col(SIGN),
            F.posexplode(F.col(node.col)).alias("__pos__", node.out),
        )
        return out.withColumn(
            RID, F.concat(F.col(RID), F.lit(":"), F.col("__pos__").cast("string"))
        ).drop("__pos__")

    if isinstance(node, (P.ScalarSubqueryFilter, P.InSubqueryFilter)):
        raise UnsupportedIncremental(f"{type(node).__name__} is FULL-refresh only (§3.3.2)")

    raise CompileError(f"unknown plan node {type(node).__name__}")


def _delta_join(node: P.Join, ctx: _Ctx) -> DataFrame:
    dl = _localize(_delta(node.left, ctx))
    dr = _localize(_delta(node.right, ctx))
    inner = P.Join(node.left, node.right, node.left_on, node.right_on, "inner", node.residual)
    # Bilinear inner rule: ΔL ⋈ R|t0 ∪ L|t1 ⋈ ΔR. SIGN rides along from the
    # delta side (the full side contributes implicit +1). The full side is
    # pre-restricted to the delta side's join keys (runtime pruning, §5.5.2):
    # only matching rows can join, so the semijoin is exact here.
    keys_l = _affected_df(dl, node.left_on)
    r_old = _semijoin_map(
        ctx.full(node.right, "old"),
        keys_l,
        {rk: f"__sk{i}__" for i, rk in enumerate(node.right_on)},
    )
    keys_r = _affected_df(dr, node.right_on)
    l_new = _semijoin_map(
        ctx.full(node.left, "new"),
        keys_r,
        {lk: f"__sk{i}__" for i, lk in enumerate(node.left_on)},
    )
    term1 = compile_join(dl, r_old, inner)
    term2 = compile_join(l_new, dr, inner)
    out = term1.unionByName(term2)
    if node.how == "inner":
        return out

    l_old, l_new = ctx.full(node.left, "old"), ctx.full(node.left, "new")
    r_old, r_new = ctx.full(node.right, "old"), ctx.full(node.right, "new")

    def anti_part(side: str) -> DataFrame:
        """Recompute the NULL-padded anti rows for keys touched by either delta."""
        if side == "left":
            own_old, own_new, other_old, other_new = l_old, l_new, r_old, r_new
            own_on, other_on, prefix, pad_like = node.left_on, node.right_on, "a:", r_old
        else:
            own_old, own_new, other_old, other_new = r_old, r_new, l_old, l_new
            own_on, other_on, prefix, pad_like = node.right_on, node.left_on, "b:", l_old
        d_own = dl if side == "left" else dr
        d_other = dr if side == "left" else dl
        keys_own = d_own.select(*[F.col(k) for k in own_on])
        keys_other = d_other.select(
            *[F.col(o).alias(k) for k, o in zip(own_on, other_on)]
        )
        affected = keys_own.unionByName(keys_other).distinct()
        on_pairs = [(k, k) for k in own_on]
        # Restricting the owning side *before* the anti join is exact:
        # anti(own ⋉ K, other) == anti(own, other) ⋉ K.
        old_anti = _anti(
            _semijoin_nullsafe(own_old, affected, on_pairs), other_old, own_on, other_on
        )
        new_anti = _anti(
            _semijoin_nullsafe(own_new, affected, on_pairs), other_new, own_on, other_on
        )
        old_anti = _null_pad(old_anti, pad_like).withColumn(SIGN, F.lit(-1))
        new_anti = _null_pad(new_anti, pad_like).withColumn(SIGN, F.lit(1))
        both = old_anti.unionByName(new_anti)
        return both.withColumn(RID, F.concat(F.lit(prefix), F.col(RID)))

    if node.how in ("left", "full"):
        out = out.unionByName(anti_part("left"), allowMissingColumns=False)
    if node.how in ("right", "full"):
        out = out.unionByName(anti_part("right"), allowMissingColumns=False)
    return out


def _delta_aggregate(node: P.Aggregate, ctx: _Ctx) -> DataFrame:
    dchild = _delta(node.child, ctx)
    affected = _localize(_affected_df(dchild, node.keys))
    keymap = {k: f"__sk{i}__" for i, k in enumerate(node.keys)}
    aggs = [F.expr(e).alias(n) for n, e in node.aggs]

    def recompute(which: str, sign: int) -> DataFrame:
        src = _compile_restricted(node.child, ctx, which, affected, keymap)
        out = src.groupBy(*node.keys).agg(*aggs)
        # exact trim: the pushdown may overselect rows of unchanged groups
        out = _semijoin_map(out, affected, keymap)
        return out.withColumn(RID, group_rid(list(node.keys))).withColumn(SIGN, F.lit(sign))

    return recompute("old", -1).unionByName(recompute("new", 1))


def _delta_distinct(node: P.Distinct, ctx: _Ctx) -> DataFrame:
    dchild = _delta(node.child, ctx)
    cols = user_cols(dchild)
    affected = _localize(_affected_df(dchild, tuple(cols)))
    keymap = {c: f"__sk{i}__" for i, c in enumerate(cols)}

    def recompute(which: str, sign: int) -> DataFrame:
        src = _compile_restricted(node.child, ctx, which, affected, keymap)
        out = src.select(*cols).distinct()
        out = _semijoin_map(out, affected, keymap)
        return out.withColumn(RID, group_rid(cols)).withColumn(SIGN, F.lit(sign))

    return recompute("old", -1).unionByName(recompute("new", 1))


def _delta_window(node: P.Window, ctx: _Ctx) -> DataFrame:
    dchild = _delta(node.child, ctx)
    affected = _localize(_affected_df(dchild, node.partition_by))
    keymap = {k: f"__sk{i}__" for i, k in enumerate(node.partition_by)}

    def recompute(which: str, sign: int) -> DataFrame:
        src = _compile_restricted(node.child, ctx, which, affected, keymap)
        # exact trim *before* the window: all rows of an affected partition
        # are present (the pushdown is partition-complete on the keys), and
        # unchanged partitions must not be recomputed/emitted
        src = _semijoin_map(src, affected, keymap)
        out = src.selectExpr("*", *[f"{e} AS {n}" for n, e in node.exprs])
        return out.withColumn(SIGN, F.lit(sign))

    return recompute("old", -1).unionByName(recompute("new", 1))


def consolidate_delta(delta: DataFrame) -> DataFrame:
    """Sum signs per (rid, row values); drop net-zero rows (§5.5's
    change-consolidation step). NaN and NULL group as themselves in Spark."""
    vcols = [c for c in delta.columns if c not in (RID, SIGN)]
    net = (
        delta.groupBy(F.col(RID), *[F.col(c) for c in vcols])
        .agg(F.sum(SIGN).alias(SIGN))
        .filter(F.col(SIGN) != 0)
    )
    return net
