"""Shared harness for the experiment modules: dataset construction at a
physical SF with logical-size scaling (DESIGN.md substitution #3), sample
generation for COMPREDICT, and formatting helpers."""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro import synth_data as sd
from repro.core import compredict as cp
from repro.storage import codecs
from repro.workload import queries as wq


def tpch_table_files(
    *,
    sf: float,
    logical_total_gb: float | None = None,
    n_files: int = 16,
    skew: float | None = None,
    seed: int = 0,
) -> dict[str, wq.TableFiles]:
    """TPC-H-lite tables split into files; logical sizes scaled so that the
    per-table shares of ``logical_total_gb`` match the physical byte shares."""
    pdfs = {
        name: gen(sf=sf, seed=seed + i, skew=skew)
        for i, (name, gen) in enumerate(sd.TPCH_PDF.items())
    }
    phys = {n: p.memory_usage(deep=True).sum() for n, p in pdfs.items()}
    total_phys = sum(phys.values())
    out = {}
    for name, pdf in pdfs.items():
        logical = (
            logical_total_gb * phys[name] / total_phys
            if logical_total_gb is not None
            else None
        )
        out[name] = wq.split_table(
            pdf,
            name,
            n_files=n_files,
            sort_col=sd.TPCH_SORT_COL[name],
            logical_size_gb=logical,
        )
    return out


def enterprise_table_files(
    *,
    sf: float,
    logical_total_gb: float = 1.5,
    n_files: int = 12,
    seed: int = 0,
) -> dict[str, wq.TableFiles]:
    """The 3-table Enterprise Data II stand-in (paper: ~1.5 GB total)."""
    pdfs = {name: gen(sf=sf) for name, gen in sd.ENTERPRISE_PDF.items()}
    phys = {n: p.memory_usage(deep=True).sum() for n, p in pdfs.items()}
    total_phys = sum(phys.values())
    return {
        name: wq.split_table(
            pdf,
            name,
            n_files=n_files,
            sort_col=sd.ENTERPRISE_SORT_COL[name],
            logical_size_gb=logical_total_gb * phys[name] / total_phys,
        )
        for name, pdf in pdfs.items()
    }


def query_samples(
    tables: dict[str, wq.TableFiles],
    queries: list[wq.Query],
    *,
    max_rows: int = 4000,
    max_samples: int | None = None,
    min_rows: int = 5,
) -> list[pd.DataFrame]:
    """Materialise query results as COMPREDICT training samples (§V: 'samples
    used to train the model are derived from results of queries')."""
    out = []
    for q in queries:
        res = wq.run_query_pandas(tables[q.table].pdf, q)
        if len(res) < min_rows:
            continue
        if len(res) > max_rows:
            res = res.iloc[:max_rows].reset_index(drop=True)
        out.append(res)
        if max_samples is not None and len(out) >= max_samples:
            break
    return out


def compredict_dataset(
    samples: list[pd.DataFrame],
    schemes: tuple[str, ...],
    *,
    repeats: int = 2,
) -> pd.DataFrame:
    """Featurise + label samples into a model-ready frame."""
    records = [cp.featurize_sample(s, schemes, repeats=repeats) for s in samples]
    return cp.build_dataset(records, schemes)


#: Table-name aliases between the paper's scheme labels and ours.
PAPER_SCHEME = {
    "gzip": "csv+gzip",
    "snappy": "csv+snappy",
    "parquet + gzip": "parquet+gzip",
    "parquet + snappy": "parquet+snappy",
    "parquet + lz4": "parquet+lz4",
}


def metrics_grid(
    dataset: pd.DataFrame,
    *,
    models: dict,
    schemes: dict[str, str],
    target_prefix: str,
    features: tuple[str, ...],
    seed: int = 0,
) -> pd.DataFrame:
    """models x schemes grid of MAE/MAPE/R² — the layout of Tables VI–VIII."""
    rows = []
    for mname, factory in models.items():
        row: dict = {"Model": mname}
        for label, scheme in schemes.items():
            m = cp.train_eval(
                dataset,
                target=f"{target_prefix}_{scheme}",
                features=features,
                model_factory=factory,
                seed=seed,
            )
            row[f"{label} MAE"] = round(m["MAE"], 4)
            row[f"{label} MAPE"] = round(m["MAPE"], 3)
            row[f"{label} R2"] = round(m["R2"], 3)
        rows.append(row)
    return pd.DataFrame(rows)


def fmt(df: pd.DataFrame) -> str:
    """Console rendering used by the bench/job entrypoints."""
    return df.to_string(index=False)
