"""The ``Basic`` local-embedding baseline (paper §7, "Embedding Generation
Algorithms").

Basic skips the graph/walk machinery: its corpus is built from
(a) random *permutations of each row's tokens* (prefixed by the RID) and
(b) *sentences of samples from each attribute's tokens* (with the CID
inserted), so it is structure-aware — it can learn RID and CID vectors —
but it only ever sees intra-row and intra-column co-occurrence. The paper
fixes its corpus size to EmbDI's token budget; we do the same.

Sentence generation fans out with ``mapInPandas`` over the grouped rows /
columns, mirroring the walk kernel's dataflow.
"""
from __future__ import annotations

import math
import zlib
from typing import Iterable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.walks import SENTENCE_SCHEMA


def _row_kernel(n_perm: int, seed: int):
    def kernel(batches: Iterable[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            ids, sents = [], []
            for rid, toks in zip(pdf["rid"], pdf["toks"]):
                rng = np.random.default_rng([seed, zlib.crc32(rid.encode())])
                toks = list(toks)
                for p in range(n_perm):
                    perm = list(rng.permutation(toks))
                    ids.append(p)
                    sents.append([rid] + perm)
            yield pd.DataFrame({"walk_id": ids, "sentence": sents})

    return kernel


def _col_kernel(n_sent: int, sent_len: int, seed: int):
    def kernel(batches: Iterable[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            ids, sents = [], []
            for cid, toks in zip(pdf["cid"], pdf["toks"]):
                rng = np.random.default_rng([seed, zlib.crc32(cid.encode())])
                toks = list(toks)
                for s in range(n_sent):
                    # sample with replacement to the full sentence length —
                    # small domains just repeat tokens (the budget math in
                    # basic_corpus assumes sent_len tokens per sentence)
                    sample = list(rng.choice(toks, size=sent_len, replace=True))
                    pos = int(rng.integers(0, len(sample) + 1))
                    ids.append(s)
                    sents.append(sample[:pos] + [cid] + sample[pos:])
            yield pd.DataFrame({"walk_id": ids, "sentence": sents})

    return kernel


def basic_corpus(
    spark: SparkSession,
    tokens: DataFrame,
    target_tokens: int,
    sent_len: int = 60,
    seed: int = 0,
) -> DataFrame:
    """Build Basic's corpus from a tokenized cell frame.

    Half the token budget goes to row permutations, half to attribute
    sample sentences, as the method description prescribes ("permutations
    of row tokens and sentences with samples of attribute tokens").
    """
    counts = tokens.agg(
        F.count(F.lit(1)).alias("n_cells"),
        F.countDistinct("rid").alias("n_rows"),
        F.countDistinct("cid").alias("n_cols"),
    ).first()
    avg_row_len = max(1.0, counts["n_cells"] / max(1, counts["n_rows"]))
    n_perm = max(1, math.ceil((target_tokens / 2) / (counts["n_rows"] * (avg_row_len + 1))))
    n_col_sent = max(
        1, math.ceil((target_tokens / 2) / (counts["n_cols"] * (sent_len + 1)))
    )
    rows = tokens.groupBy("rid").agg(F.collect_list("token").alias("toks"))
    cols = tokens.groupBy("cid").agg(F.collect_list("token").alias("toks"))
    row_sents = rows.mapInPandas(_row_kernel(n_perm, seed), schema=SENTENCE_SCHEMA)
    col_sents = cols.mapInPandas(
        _col_kernel(n_col_sent, sent_len, seed + 1), schema=SENTENCE_SCHEMA
    )
    return row_sents.unionByName(col_sents)
