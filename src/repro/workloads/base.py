"""Workload model: knobs, cost model, quality model, task graphs.

A *workload* is the user-provided part of a V-ETL job (red boxes in the
paper's Figure 1): a DAG of UDFs plus registered knobs with their value
domains.  Skyscraper itself is agnostic to what the UDFs compute — it only
sees, per knob configuration k:

* the *work* w(k) it induces (core-seconds per second of video), measured
  by profiling in the offline phase,
* the *quality* qual(k, s) the user code reports per segment s,
* the task graph G_k with per-node on-premise runtimes, cloud round-trip
  times, and payload sizes (used for placement search and simulation).

Since we substitute real CV models with analytic models (DESIGN.md §2),
each workload here defines a *capability vector* per configuration; the
quality on a segment is a smooth function of capability minus the
segment's latent difficulty.  The observation noise on reported quality
reproduces the fact that user-reported quality metrics (model
certainties, tracker errors) are noisy estimates of true accuracy.
"""
from __future__ import annotations

import abc
import itertools
import zlib
from dataclasses import dataclass

import numpy as np

from repro.video.content import (
    ContentParams,
    ContentTrace,
    generate,
    hash_normal,
)

SECONDS_PER_DAY = 86_400.0

Config = tuple  # one value per knob, aligned with Workload.knobs


@dataclass(frozen=True)
class KnobSpec:
    """A user-registered knob: a name and its finite value domain."""

    name: str
    domain: tuple


@dataclass(frozen=True)
class TaskNode:
    """One UDF stage per segment in a configuration's task graph.

    A stage covers all invocations of one UDF on one segment (e.g. all
    detector calls): ``width`` independent sub-tasks that the scheduler
    can spread over cores (or parallel cloud functions), totalling
    ``onprem_s`` core-seconds on premises.  ``cloud_s`` is the cloud
    execution latency of *one* sub-task including the HTTPS round trip
    (sub-tasks run on parallel Lambda workers; billing is by compute,
    i.e. ``onprem_s`` core-seconds).  The simulator adds up/down
    transfer times from the payload sizes.  ``pin_onprem`` marks stages
    that cannot be offloaded (e.g. decode, which needs the raw stream).
    """

    name: str
    onprem_s: float
    cloud_s: float
    up_bytes: float
    down_bytes: float
    pin_onprem: bool = False
    width: int = 1


@dataclass(frozen=True)
class TaskGraph:
    """DAG of task nodes; edges are (src_index, dst_index)."""

    nodes: tuple[TaskNode, ...]
    edges: tuple[tuple[int, int], ...]

    def __post_init__(self) -> None:
        n = len(self.nodes)
        for a, b in self.edges:
            if not (0 <= a < n and 0 <= b < n):
                raise ValueError(f"edge ({a},{b}) out of range for {n} nodes")
            if a >= b:
                raise ValueError("edges must go from lower to higher index")

    @property
    def total_onprem_s(self) -> float:
        return sum(nd.onprem_s for nd in self.nodes)


def soft_quality(
    cap: np.ndarray,
    difficulty: np.ndarray,
    *,
    tau: float = 0.09,
    floor: float = 0.35,
) -> np.ndarray:
    """Per-dimension sigmoid of (capability - difficulty), combined
    multiplicatively with a floor.

    cap: (D,) capability of the configuration; difficulty: (n, D).
    Returns (n,) qualities in (0, 1).  tau controls how sharply quality
    degrades once content difficulty exceeds the configuration's
    capability; the multiplicative combination means failing on *one*
    dimension (e.g. occlusions during rush hour) tanks the segment's
    quality — matching the paper's observation that cheap configurations
    are "prone to mistakes on difficult inputs" — while ``floor`` keeps
    a failing dimension from zeroing quality entirely (a detector that
    cannot handle occlusions still detects the unoccluded people).
    """
    z = (cap[None, :] - difficulty) / tau
    s = 1.0 / (1.0 + np.exp(-np.clip(z, -60.0, 60.0)))
    return (floor + (1.0 - floor) * s).prod(axis=1)


class Workload(abc.ABC):
    """Abstract V-ETL workload (COVID / MOT / MOSEI variants)."""

    name: str
    knobs: tuple[KnobSpec, ...]
    seg_len: float
    dims: tuple[str, ...]
    tau: float = 0.09
    quality_floor: float = 0.35
    # One traffic-camera feed produces 7.8 GB/day (paper footnote 2).
    bitrate_bytes_per_s: float = 7.8e9 / SECONDS_PER_DAY
    quality_noise: float = 0.02
    # MOSEI weights segment quality by the concurrent-stream count.
    quality_weight_by_multiplier: bool = False
    test_days: float = 8.0
    train_days: float = 16.0

    # -- knob configurations ------------------------------------------------
    def all_configs(self) -> list[Config]:
        """Cross product of all knob domains (exponential, offline only)."""
        return [
            tuple(v)
            for v in itertools.product(*(k.domain for k in self.knobs))
        ]

    def config_dict(self, cfg: Config) -> dict:
        return {k.name: v for k, v in zip(self.knobs, cfg)}

    # -- cost / quality models ---------------------------------------------
    def work_per_vs(self, cfg: Config) -> float:
        """core-seconds of work per second of video, at multiplier 1.

        Derived from the configuration's task graph (single source of
        truth between the cost model and the runtime simulator), memoized
        per configuration.
        """
        cache = self.__dict__.setdefault("_work_cache", {})
        if cfg not in cache:
            cache[cfg] = self.task_graph(cfg).total_onprem_s / self.seg_len
        return cache[cfg]

    @abc.abstractmethod
    def capability(self, cfg: Config) -> np.ndarray:
        """Capability vector in [0, 1]^D."""

    def base_quality(self, cfg: Config) -> float:
        """Content-independent quality ceiling of the configuration."""
        return 1.0

    def mass(
        self, difficulty: np.ndarray, mult: np.ndarray | float = 1.0
    ) -> np.ndarray:
        """Quality *mass* of each segment.

        The paper's quality metrics are extensive: "person * seconds
        recorded" (COVID), "number of people correctly tracked" (MOT),
        "certainty-weighted sum over ingested streams" (MOSEI).  A quiet
        night segment simply has little quality to win, while rush hour
        carries most of the quality mass — which is exactly why spending
        the budget on hard content pays off.  Default: proportional to
        the primary difficulty dimension (the object count); MOSEI
        overrides this with the concurrent-stream count.
        """
        d0 = np.atleast_2d(difficulty)[:, 0]
        return 0.15 + 2.6 * d0**1.7

    def accuracy_curve(self, cfg: Config, trace: ContentTrace) -> np.ndarray:
        """Noiseless per-segment accuracy in [0, 1] (mass-free)."""
        q = soft_quality(
            self.capability(cfg),
            trace.difficulty,
            tau=self.tau,
            floor=self.quality_floor,
        )
        return self.base_quality(cfg) * q

    def quality_curve(self, cfg: Config, trace: ContentTrace) -> np.ndarray:
        """Noiseless per-segment quality (ground truth): mass x accuracy."""
        return self.mass(
            trace.difficulty, trace.work_multiplier
        ) * self.accuracy_curve(cfg, trace)

    def noise_key(self, cfg: Config, seed: int) -> int:
        """Stable per-(seed, config) noise key.  zlib.crc32 instead of
        hash(): str hashing is salted per process, which would break
        determinism across Spark workers."""
        return (seed * 0x1000003) ^ zlib.crc32(repr(cfg).encode())

    def observed_quality(
        self,
        cfg: Config,
        difficulty: np.ndarray,
        ids: np.ndarray,
        *,
        seed: int,
        mult: np.ndarray | float = 1.0,
    ) -> np.ndarray:
        """Reported quality for segments identified by global ids.

        Noise is a pure function of (seed, config, segment id) so results
        are identical regardless of slicing or Spark partitioning.  Noise
        applies to the accuracy (the CV model's certainty estimate is
        noisy), then the mass scales it — the object count itself is
        observable.
        """
        acc = self.base_quality(cfg) * soft_quality(
            self.capability(cfg),
            difficulty,
            tau=self.tau,
            floor=self.quality_floor,
        )
        noise = hash_normal(self.noise_key(cfg, seed), ids)
        acc = np.clip(acc + self.quality_noise * noise, 0.0, 1.0)
        return self.mass(difficulty, mult) * acc

    def observed_quality_curve(
        self, cfg: Config, trace: ContentTrace, *, seed: int
    ) -> np.ndarray:
        """Quality as *reported* by the user code: truth + noise."""
        return self.observed_quality(
            cfg,
            trace.difficulty,
            trace.global_ids(),
            seed=seed,
            mult=trace.work_multiplier,
        )

    def work_curve(self, cfg: Config, trace: ContentTrace) -> np.ndarray:
        """core-seconds of work per segment (multiplier-scaled)."""
        return (
            self.work_per_vs(cfg) * self.seg_len * trace.work_multiplier
        )

    # -- content ------------------------------------------------------------
    @abc.abstractmethod
    def content_params(self) -> ContentParams:
        ...

    def content(
        self, *, seed: int, n_days: float, start_day: float = 0.0
    ) -> ContentTrace:
        return generate(
            self.content_params(), seed=seed, n_days=n_days, start_day=start_day
        )

    # -- task graph ----------------------------------------------------------
    @abc.abstractmethod
    def task_graph(self, cfg: Config) -> TaskGraph:
        """Per-segment task graph for configuration ``cfg``."""

    # -- helpers -------------------------------------------------------------
    def cheapest_config(self, configs=None) -> Config:
        configs = list(configs) if configs is not None else self.all_configs()
        return min(configs, key=self.work_per_vs)

    def best_config(self, configs=None) -> Config:
        """Most qualitative configuration (highest capability norm)."""
        configs = list(configs) if configs is not None else self.all_configs()
        return max(
            configs,
            key=lambda c: (
                self.base_quality(c) * float(self.capability(c).mean()),
                -self.work_per_vs(c),
            ),
        )
