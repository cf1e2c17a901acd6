"""EDB catalog: named relations + per-attribute value domains.

The paper assumes the user specifies the domain 𝔻_A of each attribute A
as a unary query (with "reasonable defaults"). Our default is the active
domain of the attribute — ``SELECT DISTINCT col FROM rel`` — and
variable domains are unions of the domains of the attributes the
variable is bound to (``attrs(X)`` in Sec. 5.2). Overrides can be
registered per attribute for experiments that need a fixed 𝔻.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.ast import Rule, Var

#: An attribute occurrence: (relation name, 0-based column position).
Occurrence = tuple[str, int]


class Catalog:
    """Registry of EDB relations (Spark DataFrames) and attribute domains."""

    def __init__(self, spark: SparkSession, tables: dict[str, DataFrame]):
        self.spark = spark
        self._tables = dict(tables)
        self._domain_overrides: dict[Occurrence, DataFrame] = {}
        self._domain_size_cache: dict[tuple[Occurrence, ...], int] = {}

    def relation_names(self) -> list[str]:
        return sorted(self._tables)

    def df(self, name: str) -> DataFrame:
        if name not in self._tables:
            raise KeyError(f"unknown relation {name!r}")
        return self._tables[name]

    def columns(self, name: str) -> list[str]:
        return list(self.df(name).columns)

    def column_map(self) -> dict[str, list[str]]:
        """Predicate → column names, the shape ``repro.core.sqlgen`` wants."""
        return {name: self.columns(name) for name in self._tables}

    def set_domain(self, relation: str, pos: int, domain: DataFrame) -> None:
        """Override 𝔻_A for one attribute with a unary DataFrame."""
        if len(domain.columns) != 1:
            raise ValueError("a domain must be a unary DataFrame")
        self._domain_overrides[(relation, pos)] = domain
        self._domain_size_cache.clear()

    def attribute_domain(self, relation: str, pos: int) -> DataFrame:
        """𝔻_A for one attribute as a unary DataFrame named ``value``."""
        override = self._domain_overrides.get((relation, pos))
        if override is not None:
            return override.select(F.col(override.columns[0]).alias("value")).distinct()
        df = self.df(relation)
        col = df.columns[pos]
        return df.select(F.col(col).alias("value")).distinct()

    def domain(self, occurrences: list[Occurrence]) -> DataFrame:
        """Union of attribute domains for a set of occurrences (attrs(X))."""
        if not occurrences:
            raise ValueError("domain requires at least one attribute occurrence")
        doms = [self.attribute_domain(r, p) for r, p in occurrences]
        out = doms[0]
        base_type = out.schema[0].dataType
        for d in doms[1:]:
            out = out.union(d.select(F.col("value").cast(base_type)))
        return out.distinct()

    def domain_size(self, occurrences: list[Occurrence]) -> int:
        key = tuple(sorted(occurrences))
        if key not in self._domain_size_cache:
            self._domain_size_cache[key] = self.domain(occurrences).count()
        return self._domain_size_cache[key]


def attrs_of_vars(rule: Rule) -> dict[Var, list[Occurrence]]:
    """``attrs(X)`` for each variable: attribute occurrences binding X.

    Follows Sec. 5.2 — every literal (positive or negated) in which X
    appears contributes its (relation, position) pairs.
    """
    out: dict[Var, list[Occurrence]] = {}
    for atom in rule.body:
        for pos, arg in enumerate(atom.args):
            if isinstance(arg, Var):
                occs = out.setdefault(arg, [])
                if (atom.pred, pos) not in occs:
                    occs.append((atom.pred, pos))
    return out
