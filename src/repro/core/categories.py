"""Content categories (paper Section 3.2).

Skyscraper samples video segments from the unlabeled training data,
processes each with every filtered knob configuration, and clusters the
resulting |K|-dimensional *quality vectors* with KMeans.  A category is a
cluster center [qual_hat(k_1, c), ..., qual_hat(k_K, c)]: the average
quality each configuration achieves on content of that category.

Profiling the (segments x configurations) quality matrix is the Spark
part: segments become a DataFrame, a ``mapInPandas`` stage evaluates all
configurations per batch (this is where real UDF DAGs would run), and a
pivot produces the quality vectors.  A pure-numpy path exists for small
inputs and as a parity oracle in tests.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.kmeans import assign, kmeans
from repro.video.content import ContentTrace
from repro.workloads.base import Config, Workload


@dataclass(frozen=True)
class Categories:
    """Fitted content categories over a filtered configuration set."""

    centers: np.ndarray  # (C, K) — sorted by ascending mean quality
    configs: tuple[Config, ...]

    @property
    def n(self) -> int:
        return len(self.centers)

    @property
    def n_configs(self) -> int:
        return self.centers.shape[1]

    def classify_full(self, quality_vectors: np.ndarray) -> np.ndarray:
        """Ground-truth style classification using all |K| dimensions."""
        return assign(np.atleast_2d(quality_vectors), self.centers)

    def classify_1d(self, k_idx: int, quality) -> np.ndarray:
        """Online classification (paper Eq. 5): nearest center using only
        the dimension of the currently running configuration."""
        q = np.atleast_1d(np.asarray(quality, dtype=float))
        d = np.abs(self.centers[None, :, k_idx] - q[:, None])
        return d.argmin(axis=1)

    def qual_hat(self) -> np.ndarray:
        """(K, C) expected-quality matrix for the planner LP."""
        return self.centers.T


def sample_segment_indices(
    trace: ContentTrace, *, sample_frac: float, seed: int
) -> np.ndarray:
    rng = np.random.default_rng((seed, 0x5A3217))
    n = trace.n_segments
    size = max(2, int(round(n * sample_frac)))
    size = min(size, n)
    return np.sort(rng.choice(n, size=size, replace=False))


def quality_vectors_numpy(
    wl: Workload,
    trace: ContentTrace,
    configs: list[Config],
    idx: np.ndarray,
    *,
    seed: int = 0,
    noisy: bool = True,
) -> np.ndarray:
    """(n_samples, K) quality matrix, reference implementation."""
    diff = trace.difficulty[idx]
    gids = trace.global_ids()[idx]
    mult = trace.work_multiplier[idx]
    sub = trace.take(idx)
    cols = []
    for cfg in configs:
        if noisy:
            cols.append(
                wl.observed_quality(cfg, diff, gids, seed=seed, mult=mult)
            )
        else:
            cols.append(wl.quality_curve(cfg, sub))
    return np.column_stack(cols)


def quality_vectors_spark(
    spark,
    wl: Workload,
    trace: ContentTrace,
    configs: list[Config],
    idx: np.ndarray,
    *,
    seed: int = 0,
    noisy: bool = True,
) -> np.ndarray:
    """Same quality matrix, computed as a Spark dataflow.

    Segments are distributed over partitions; each ``mapInPandas`` batch
    evaluates every configuration on its slice of segments (in a real
    deployment this is where the UDF DAG executes on the cluster).
    """
    dims = list(wl.dims)
    pdf = pd.DataFrame(trace.difficulty[idx], columns=dims)
    pdf.insert(0, "pos", np.arange(len(idx)))
    pdf["gid"] = trace.global_ids()[idx]
    pdf["mult"] = trace.work_multiplier[idx]
    seg_df = spark.createDataFrame(pdf).repartition(
        max(1, min(16, len(idx) // 64 + 1))
    )

    def eval_configs(batches):
        from repro.workloads.base import soft_quality as _soft

        for b in batches:
            if not len(b):
                continue
            diff = b[dims].to_numpy(dtype=float)
            gids = b["gid"].to_numpy()
            mult = b["mult"].to_numpy(dtype=float)
            out = []
            for ci, cfg in enumerate(configs):
                if noisy:
                    q = wl.observed_quality(
                        cfg, diff, gids, seed=seed, mult=mult
                    )
                else:
                    q = wl.mass(diff, mult) * wl.base_quality(cfg) * _soft(
                        wl.capability(cfg),
                        diff,
                        tau=wl.tau,
                        floor=wl.quality_floor,
                    )
                out.append(
                    pd.DataFrame(
                        {"pos": b["pos"].to_numpy(), "config_id": ci, "qual": q}
                    )
                )
            yield pd.concat(out, ignore_index=True)

    long_df = seg_df.mapInPandas(
        eval_configs, schema="pos long, config_id int, qual double"
    )
    # collect the long table and pivot driver-side: the matrix is small
    # (sample x |K|) and a Spark pivot costs a full extra shuffle
    long_pdf = long_df.toPandas()
    wide = long_pdf.pivot(index="pos", columns="config_id", values="qual")
    wide = wide.sort_index()
    return wide[list(range(len(configs)))].to_numpy(dtype=float)


def fit_categories(
    quality_vectors: np.ndarray,
    configs: list[Config],
    n_categories: int,
    *,
    seed: int = 0,
) -> Categories:
    """KMeans on the quality vectors; centers sorted by ascending mean
    quality so category 0 is always the hardest content."""
    res = kmeans(quality_vectors, n_categories, seed=seed)
    order = np.argsort(res.centers.mean(axis=1))
    return Categories(centers=res.centers[order], configs=tuple(configs))
