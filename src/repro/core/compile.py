"""Lower the relational IR to Spark DataFrames (full refresh plans), and to
DuckDB SQL (for the oracle).

Every compiled DataFrame carries the hidden ``__rid__`` column: the paper's
``$ROW_ID`` (§5.5), a *structural* row identifier that is stable across
refreshes so incremental changes can be merged by id. Row-id construction
follows §5.5.2's plaintext-prefix design:

==============  ======================================================
operator        row id of an output row
==============  ======================================================
Scan            the stored base-row id  ``table:<seq>``
Filter/Project  pass-through
Window          pass-through (window funcs only add columns)
Join (inner)    ``<left rid>|<right rid>``
Join (anti pad) ``a:<left rid>`` / ``b:<right rid>`` (NULL-padded rows)
UnionAll        ``u0:<rid>`` / ``u1:<rid>`` per branch
Aggregate       ``g:<key values joined by 0x1f>``
Distinct        ``g:<row values joined by 0x1f>``
Flatten         ``<rid>:<pos>``
==============  ======================================================
"""
from __future__ import annotations

from typing import Protocol

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core import plan as P
from repro.substrate.versioned_store import RID

_L_RID = "__lrid__"
_R_RID = "__rrid__"
_NULL_MARK = "\x00"
_SEP = "\x1f"


class ScanResolver(Protocol):
    """Resolves a table name to a Spark DataFrame snapshot (incl. ``RID``)."""

    def scan(self, table: str) -> DataFrame: ...


def user_cols(df: DataFrame) -> list[str]:
    """The user-visible columns of a compiled DataFrame (metadata stripped)."""
    from repro.substrate.versioned_store import SIGN

    return [c for c in df.columns if c not in (RID, SIGN, _L_RID, _R_RID)]


def group_rid(keys: list[str], prefix: str = "g:") -> Column:
    """Row id for a group: plaintext key values, NULL-marked, 0x1f-joined."""
    if not keys:
        return F.lit(prefix)
    parts = [F.coalesce(F.col(k).cast("string"), F.lit(_NULL_MARK)) for k in keys]
    return F.concat(F.lit(prefix), F.concat_ws(_SEP, *parts))


class CompileError(ValueError):
    """Raised for IR shapes the compiler rejects (e.g. column collisions)."""


def compile_full(node: P.Plan, resolver: ScanResolver) -> DataFrame:
    """Compile ``node`` to a DataFrame computing the full query result + RID."""
    if isinstance(node, P.Scan):
        return resolver.scan(node.table)

    if isinstance(node, P.Filter):
        return compile_full(node.child, resolver).filter(F.expr(node.predicate))

    if isinstance(node, P.Project):
        df = compile_full(node.child, resolver)
        return df.select(*[F.expr(e).alias(n) for n, e in node.exprs], F.col(RID))

    if isinstance(node, P.Join):
        l = compile_full(node.left, resolver)
        r = compile_full(node.right, resolver)
        return compile_join(l, r, node)

    if isinstance(node, P.UnionAll):
        l = compile_full(node.left, resolver)
        r = compile_full(node.right, resolver)
        if set(user_cols(l)) != set(user_cols(r)):
            raise CompileError("UnionAll branches must have identical columns")
        l2 = l.withColumn(RID, F.concat(F.lit("u0:"), F.col(RID)))
        r2 = r.withColumn(RID, F.concat(F.lit("u1:"), F.col(RID)))
        return l2.unionByName(r2)

    if isinstance(node, P.Aggregate):
        df = compile_full(node.child, resolver)
        aggs = [F.expr(e).alias(n) for n, e in node.aggs]
        if node.keys:
            out = df.groupBy(*node.keys).agg(*aggs)
        else:
            out = df.agg(*aggs)
        return out.withColumn(RID, group_rid(list(node.keys)))

    if isinstance(node, P.Distinct):
        df = compile_full(node.child, resolver)
        cols = user_cols(df)
        return df.select(*cols).distinct().withColumn(RID, group_rid(cols))

    if isinstance(node, P.Window):
        df = compile_full(node.child, resolver)
        return df.selectExpr("*", *[f"{e} AS {n}" for n, e in node.exprs])

    if isinstance(node, P.Flatten):
        df = compile_full(node.child, resolver)
        others = [c for c in user_cols(df) if c != node.col]
        out = df.select(
            *others, F.col(RID), F.posexplode(F.col(node.col)).alias("__pos__", node.out)
        )
        return out.withColumn(
            RID, F.concat(F.col(RID), F.lit(":"), F.col("__pos__").cast("string"))
        ).drop("__pos__")

    if isinstance(node, P.ScalarSubqueryFilter):
        df = compile_full(node.child, resolver)
        sub = compile_full(node.sub, resolver)
        scalar = sub.agg(F.expr(node.sub_agg).alias("__scalar__"))
        return (
            df.crossJoin(scalar)
            .filter(F.expr(f"{node.col} {node.op} __scalar__"))
            .drop("__scalar__")
        )

    if isinstance(node, P.InSubqueryFilter):
        df = compile_full(node.child, resolver)
        sub = compile_full(node.sub, resolver).select(F.col(node.sub_col).alias("__in__")).distinct()
        how = "left_anti" if node.negated else "left_semi"
        return df.join(sub, on=df[node.col] == sub["__in__"], how=how)

    raise CompileError(f"unknown plan node {type(node).__name__}")


def compile_join(l: DataFrame, r: DataFrame, node: P.Join) -> DataFrame:
    """Join two compiled inputs, building the §5.5.2 row id for every shape."""
    lu, ru = user_cols(l), user_cols(r)
    if set(lu) & set(ru):
        raise CompileError(f"join sides share columns: {set(lu) & set(ru)}")
    if node.residual is not None and node.how != "inner":
        raise CompileError("residual predicates are only supported on inner joins")
    l2 = l.withColumnRenamed(RID, _L_RID)
    r2 = r.withColumnRenamed(RID, _R_RID)
    cond = None
    for lk, rk in zip(node.left_on, node.right_on):
        c = l2[lk] == r2[rk]
        cond = c if cond is None else (cond & c)
    joined = l2.join(r2, on=cond, how=node.how)
    if node.residual is not None:
        joined = joined.filter(F.expr(node.residual))
    rid = (
        F.when(F.col(_R_RID).isNull() & F.col(_L_RID).isNotNull(), F.concat(F.lit("a:"), F.col(_L_RID)))
        .when(F.col(_L_RID).isNull() & F.col(_R_RID).isNotNull(), F.concat(F.lit("b:"), F.col(_R_RID)))
        .otherwise(F.concat(F.col(_L_RID), F.lit("|"), F.col(_R_RID)))
    )
    return joined.withColumn(RID, rid).drop(_L_RID, _R_RID)


# ---------------------------------------------------------------------------
# Schema inference + DuckDB SQL generation (for the oracle)
# ---------------------------------------------------------------------------


def out_columns(node: P.Plan, base_schemas: dict[str, list[str]]) -> list[str]:
    """User-visible output columns of ``node`` given base-table schemas."""
    if isinstance(node, P.Scan):
        return list(base_schemas[node.table])
    if isinstance(node, (P.Filter, P.Distinct)):
        return out_columns(node.child, base_schemas)
    if isinstance(node, (P.ScalarSubqueryFilter, P.InSubqueryFilter)):
        return out_columns(node.child, base_schemas)
    if isinstance(node, P.Project):
        return [n for n, _ in node.exprs]
    if isinstance(node, P.Join):
        return out_columns(node.left, base_schemas) + out_columns(node.right, base_schemas)
    if isinstance(node, P.UnionAll):
        return out_columns(node.left, base_schemas)
    if isinstance(node, P.Aggregate):
        return list(node.keys) + [n for n, _ in node.aggs]
    if isinstance(node, P.Window):
        return out_columns(node.child, base_schemas) + [n for n, _ in node.exprs]
    if isinstance(node, P.Flatten):
        return [c for c in out_columns(node.child, base_schemas) if c != node.col] + [node.out]
    raise CompileError(f"unknown plan node {type(node).__name__}")


def to_sql(node: P.Plan, base_schemas: dict[str, list[str]]) -> str:
    """Render ``node`` as DuckDB SQL over the named base tables.

    Used by the oracle so every compiled plan (full or post-merge DT
    contents) is checked against an independent engine.
    """
    if isinstance(node, P.Scan):
        cols = ", ".join(base_schemas[node.table])
        return f"SELECT {cols} FROM {node.table}"
    if isinstance(node, P.Filter):
        return f"SELECT * FROM ({to_sql(node.child, base_schemas)}) WHERE {node.predicate}"
    if isinstance(node, P.Project):
        sel = ", ".join(f"{e} AS {n}" for n, e in node.exprs)
        return f"SELECT {sel} FROM ({to_sql(node.child, base_schemas)})"
    if isinstance(node, P.Join):
        lcols = out_columns(node.left, base_schemas)
        rcols = out_columns(node.right, base_schemas)
        sel = ", ".join([f"_l.{c}" for c in lcols] + [f"_r.{c}" for c in rcols])
        conds = " AND ".join(
            f"_l.{lk} = _r.{rk}" for lk, rk in zip(node.left_on, node.right_on)
        )
        how = {"inner": "JOIN", "left": "LEFT JOIN", "right": "RIGHT JOIN", "full": "FULL JOIN"}[
            node.how
        ]
        sql = (
            f"SELECT {sel} FROM ({to_sql(node.left, base_schemas)}) _l "
            f"{how} ({to_sql(node.right, base_schemas)}) _r ON {conds}"
        )
        if node.residual is not None:
            sql = f"SELECT * FROM ({sql}) WHERE {node.residual}"
        return sql
    if isinstance(node, P.UnionAll):
        cols = ", ".join(out_columns(node.left, base_schemas))
        return (
            f"SELECT {cols} FROM ({to_sql(node.left, base_schemas)}) "
            f"UNION ALL SELECT {cols} FROM ({to_sql(node.right, base_schemas)})"
        )
    if isinstance(node, P.Aggregate):
        sel = ", ".join(list(node.keys) + [f"{e} AS {n}" for n, e in node.aggs])
        group = f" GROUP BY {', '.join(node.keys)}" if node.keys else ""
        return f"SELECT {sel} FROM ({to_sql(node.child, base_schemas)}){group}"
    if isinstance(node, P.Distinct):
        cols = ", ".join(out_columns(node.child, base_schemas))
        return f"SELECT DISTINCT {cols} FROM ({to_sql(node.child, base_schemas)})"
    if isinstance(node, P.Window):
        cols = out_columns(node.child, base_schemas)
        sel = ", ".join(cols + [f"{e} AS {n}" for n, e in node.exprs])
        return f"SELECT {sel} FROM ({to_sql(node.child, base_schemas)})"
    if isinstance(node, P.Flatten):
        others = [c for c in out_columns(node.child, base_schemas) if c != node.col]
        sel = ", ".join(others + [f"unnest({node.col}) AS {node.out}"])
        return f"SELECT {sel} FROM ({to_sql(node.child, base_schemas)})"
    if isinstance(node, P.ScalarSubqueryFilter):
        return (
            f"SELECT * FROM ({to_sql(node.child, base_schemas)}) "
            f"WHERE {node.col} {node.op} "
            f"(SELECT {node.sub_agg} FROM ({to_sql(node.sub, base_schemas)}))"
        )
    if isinstance(node, P.InSubqueryFilter):
        neg = "NOT " if node.negated else ""
        return (
            f"SELECT * FROM ({to_sql(node.child, base_schemas)}) "
            f"WHERE {node.col} {neg}IN "
            f"(SELECT {node.sub_col} FROM ({to_sql(node.sub, base_schemas)}))"
        )
    raise CompileError(f"unknown plan node {type(node).__name__}")
