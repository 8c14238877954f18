"""Table 2 — profiling the SIGMOD-like datasets (App. C.1).

Runs the Frost profiling pipeline (SP, TX, TC, PR, VS) on the synthetic
D2/D3 train/test splits and lays the result out like the paper's Table 2,
with the paper's numbers alongside for EXPERIMENTS.md.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.matchgen.sigmod import sigmod_split
from repro.profiling.dataset_profile import profile_dataset, vocabulary_similarity

#: the paper's Table-2 values (TC at paper scale; ours is 1/20).
PAPER_TABLE2 = {
    "x2": {"SP": 0.111, "TX": 27.99, "TC": 58_653, "PR": 0.022},
    "z2": {"SP": 0.1972, "TX": 23.69, "TC": 18_915, "PR": 0.036},
    "x3": {"SP": 0.501, "TX": 15.53, "TC": 56_616, "PR": 0.022},
    "z3": {"SP": 0.426, "TX": 15.35, "TC": 35_778, "PR": 0.121},
}
PAPER_VS = {"D2": 0.590, "D3": 0.377}


def run_table2(spark: SparkSession, scale: float = 1.0) -> pd.DataFrame:
    """Measure SP/TX/TC/PR per split and VS per dataset.

    Returns one row per split with measured and paper values side by side
    (VS is repeated on both splits of a dataset, as in the paper's layout).
    """
    rows = []
    for ds in ("D2", "D3"):
        train = sigmod_split(spark, ds, "train", scale=scale)
        test = sigmod_split(spark, ds, "test", scale=scale)
        vs = vocabulary_similarity(train.dataset, test.dataset)
        for split in (train, test):
            prof = profile_dataset(
                split.dataset, split.gold_pairs, labeled_pairs=split.labeled_pairs
            )
            paper = PAPER_TABLE2[split.name]
            rows.append(
                {
                    "split": split.name.upper(),
                    "SP": round(prof["SP"], 4),
                    "TX": round(prof["TX"], 2),
                    "TC": int(prof["TC"]),
                    "PR": round(prof["PR"], 4),
                    "VS": round(vs, 4),
                    "paper_SP": paper["SP"],
                    "paper_TX": paper["TX"],
                    "paper_TC": paper["TC"],
                    "paper_PR": paper["PR"],
                    "paper_VS": PAPER_VS[ds],
                }
            )
    return pd.DataFrame(rows)
