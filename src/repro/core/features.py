"""Compile-time query featurization (paper Table 2, §3.4/§4.4).

Walks the *real* Catalyst optimized logical plan of a Spark SQL query
(via py4j, ``df._jdf.queryExecution().optimizedPlan()``) and emits the
paper's feature vector:

- count of each operator type in a fixed 14-operator vocabulary
  ("14 operators for TPC-DS", Table 2),
- Σ all operators,
- maximum plan depth,
- number of input sources (leaf relations),
- Σ estimated input bytes (Catalyst ``stats().sizeInBytes`` of leaves),
- Σ estimated rows processed by all operators (per-node ``sizeInBytes``
  divided by an output-width estimate — Catalyst propagates only
  sizeInBytes without CBO column stats, so row counts are derived).

Only compile/optimization-time information is used — no runtime
statistics — because the model must score *before* the query runs and
with the same features as at training time (§3.4).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

#: Fixed operator vocabulary — one count feature per entry (Table 2 lists
#: "14 operators for TPC-DS"). Node names are Catalyst ``nodeName`` values
#: of optimized logical plans.
OPERATOR_VOCABULARY: tuple[str, ...] = (
    "Aggregate",
    "Project",
    "Join",
    "Filter",
    "Sort",
    "Union",
    "GlobalLimit",
    "LocalLimit",
    "LogicalRelation",
    "LogicalRDD",
    "Window",
    "Expand",
    "Generate",
    "Distinct",
)

#: Full ordered feature-name list; every feature vector follows this order.
FEATURE_NAMES: tuple[str, ...] = tuple(
    f"num_{op.lower()}" for op in OPERATOR_VOCABULARY
) + (
    "num_operators",
    "max_depth",
    "num_sources",
    "input_bytes",
    "rows_processed",
)


@dataclass
class PlanFeatures:
    """Featurization result: the vector plus a few raw diagnostics."""

    values: dict[str, float]

    def as_vector(self) -> list[float]:
        return [float(self.values[name]) for name in FEATURE_NAMES]


def _node_size_bytes(node) -> int:
    """Catalyst estimated sizeInBytes of a plan node.

    py4j maps scala BigInt to a Java/py4j object on some call paths and to
    a Python int on others, so accept both.
    """
    size = node.stats().sizeInBytes()
    return size if isinstance(size, int) else int(size.toString())


def _walk(node, depth: int, acc: dict) -> None:
    name = node.nodeName()
    acc["counts"][name] = acc["counts"].get(name, 0) + 1
    acc["num_operators"] += 1
    acc["max_depth"] = max(acc["max_depth"], depth)
    size = _node_size_bytes(node)
    width = max(1, 8 * node.output().size())  # crude avg row width estimate
    acc["rows_processed"] += size // width
    children = node.children()
    n = children.size()
    if n == 0:
        acc["num_sources"] += 1
        acc["input_bytes"] += size
    for i in range(n):
        _walk(children.apply(i), depth + 1, acc)


def featurize_plan(df: DataFrame) -> PlanFeatures:
    """Feature vector of Table 2 for a DataFrame's optimized logical plan."""
    plan = df._jdf.queryExecution().optimizedPlan()
    acc = {
        "counts": {},
        "num_operators": 0,
        "max_depth": 0,
        "num_sources": 0,
        "input_bytes": 0,
        "rows_processed": 0,
    }
    _walk(plan, 1, acc)
    values: dict[str, float] = {
        f"num_{op.lower()}": float(acc["counts"].get(op, 0))
        for op in OPERATOR_VOCABULARY
    }
    values.update(
        num_operators=float(acc["num_operators"]),
        max_depth=float(acc["max_depth"]),
        num_sources=float(acc["num_sources"]),
        input_bytes=float(acc["input_bytes"]),
        rows_processed=float(acc["rows_processed"]),
    )
    return PlanFeatures(values=values)


def featurize_sql(spark: SparkSession, sql: str) -> PlanFeatures:
    """Featurize a SQL query against the currently registered temp views."""
    return featurize_plan(spark.sql(sql))


@dataclass
class PlanNode:
    """Lightweight, pure-Python copy of a Catalyst plan node.

    Extracted once per query via py4j and then consumed JVM-free by the
    cluster simulator's task-graph builder (``repro.cluster.taskgraph``).
    """

    name: str
    size_bytes: int
    width: int  # number of output attributes
    children: list["PlanNode"]

    def walk(self):
        yield self
        for c in self.children:
            yield from c.walk()


def _extract(node) -> PlanNode:
    children = node.children()
    return PlanNode(
        name=str(node.nodeName()),
        size_bytes=_node_size_bytes(node),
        width=int(node.output().size()),
        children=[_extract(children.apply(i)) for i in range(children.size())],
    )


def extract_skeleton(df: DataFrame) -> PlanNode:
    """Pure-Python skeleton of the optimized logical plan of ``df``."""
    return _extract(df._jdf.queryExecution().optimizedPlan())
