"""Dynamic HHJ as a Spark DataFrame→DataFrame operator.

AsterixDB executes a join by hash-partitioning both inputs across nodes
and running the local Dynamic HHJ per node. We mirror that exactly at the
Spark layer (per the repro plan): Catalyst hash-partitions both inputs
into N partition pairs (``pmod(xxhash64(key), N)``), and
``cogroup(...).applyInPandas`` runs one
:class:`~repro.core.join.DynamicHybridHashJoin` instance — with its own
frame budget, insertion/victim/growth policies, and real tempfile spills
— inside the executor for each pair.

The result is a plain DataFrame, so Catalyst plans everything around the
operator; the operator itself is the paper's contribution and lives at
the record level where the paper defines it.
"""
from __future__ import annotations

from typing import Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import StructField, StructType

from .join import DynamicHybridHashJoin, HHJConfig

_PART_COL = "__hhj_part"


def _output_schema(build: DataFrame, probe: DataFrame,
                   suffix: str) -> Tuple[StructType, list, list]:
    """Build-side fields plus probe-side fields, renaming collisions."""
    bfields = list(build.schema.fields)
    bnames = {f.name for f in bfields}
    pfields = []
    pnames = []
    for f in probe.schema.fields:
        name = f.name
        while name in bnames:
            name = name + suffix
        pnames.append(name)
        pfields.append(StructField(name, f.dataType, True))
        bnames.add(name)
    return StructType(bfields + pfields), [f.name for f in bfields], pnames


def _estimate_sizes(pdf: pd.DataFrame, size_column: Optional[str]) -> list:
    """Per-row byte sizes: the explicit size column, or a deep estimate."""
    if size_column is not None and size_column in pdf.columns:
        return [int(s) for s in pdf[size_column]]
    n = max(1, len(pdf))
    per_row = max(64, int(pdf.memory_usage(deep=True).sum() / n))
    return [per_row] * len(pdf)


def dynamic_hhj_join(build: DataFrame, probe: DataFrame,
                     build_key: str, probe_key: str,
                     cfg: Optional[HHJConfig] = None,
                     num_spark_partitions: Optional[int] = None,
                     size_column: Optional[str] = None,
                     suffix: str = "_r") -> DataFrame:
    """Equi-join ``build ⋈ probe`` with the Dynamic HHJ operator.

    Parameters mirror AsterixDB's setup: ``cfg.memory_frames`` is the
    frame budget *per Spark partition pair* (per-node budget), and
    ``num_spark_partitions`` is the cluster-level hash fan-out (defaults
    to the session's shuffle parallelism). ``size_column`` names an
    integer column carrying each record's nominal size in bytes (the
    Wisconsin datasets provide one); otherwise sizes are estimated from
    the pandas memory footprint.

    Returns all build columns followed by all probe columns (collisions
    suffixed). Inner-join semantics: null keys never match.
    """
    spark = build.sparkSession
    if cfg is None:
        cfg = HHJConfig(memory_frames=256)
    n = num_spark_partitions or int(
        spark.conf.get("spark.sql.shuffle.partitions", "16")
    )
    out_schema, bnames, pnames = _output_schema(build, probe, suffix)
    b = (build.where(F.col(build_key).isNotNull())
              .withColumn(_PART_COL, F.pmod(F.xxhash64(F.col(build_key)), F.lit(n))))
    p = (probe.where(F.col(probe_key).isNotNull())
              .withColumn(_PART_COL, F.pmod(F.xxhash64(F.col(probe_key)), F.lit(n))))

    bkey_idx = bnames.index(build_key)
    pkey_idx = [f.name for f in probe.schema.fields].index(probe_key)
    # capture plain config values; HHJConfig is a simple dataclass and
    # pickles fine, but force disk spill inside executors regardless
    cfg_dict = dict(cfg.__dict__)
    cfg_dict["use_disk_spill"] = True

    def join_pair(bpdf: pd.DataFrame, ppdf: pd.DataFrame) -> pd.DataFrame:
        out_cols = bnames + pnames
        if len(bpdf) == 0 or len(ppdf) == 0:
            return pd.DataFrame({c: pd.Series(dtype="object") for c in out_cols})
        bpdf = bpdf.drop(columns=[_PART_COL])
        ppdf = ppdf.drop(columns=[_PART_COL])
        fb = cfg_dict["frame_bytes"]
        bsizes = [min(s, fb) for s in _estimate_sizes(bpdf, size_column)]
        psizes = [min(s, fb) for s in _estimate_sizes(ppdf, size_column)]
        brows = list(bpdf.itertuples(index=False, name=None))
        prows = list(ppdf.itertuples(index=False, name=None))
        build_recs = ((row[bkey_idx], bsizes[i], row) for i, row in enumerate(brows))
        probe_recs = ((row[pkey_idx], psizes[i], row) for i, row in enumerate(prows))
        op = DynamicHybridHashJoin(HHJConfig(**cfg_dict))
        pairs = op.run_collect(build_recs, probe_recs)
        if not pairs:
            return pd.DataFrame({c: pd.Series(dtype="object") for c in out_cols})
        data = [brow + prow for brow, prow in pairs]
        return pd.DataFrame(data, columns=out_cols)

    return (b.groupBy(_PART_COL)
             .cogroup(p.groupBy(_PART_COL))
             .applyInPandas(join_pair, schema=out_schema))
