"""Multi-object tracking workload (paper Section 5.2 / Appendix J).

Pipeline: object detector -> VGG feature embeddings -> TransMOT graph
transformer producing tracks.  Run on a Shibuya traffic-intersection
stream for 8 days.

Knobs (verbatim from the paper):
  * frame rate: process every {1, 5, 30, 60}-th frame
  * number of tiles: {1x1, 2x2}
  * length of history: {1, 2, 3, 5} previous frames fed to TransMOT
  * model size: {small, medium, large} TransMOT variants

Quality is the number of correctly tracked people weighted by reported
certainty; ground truth in the paper is TransMOT at an even more
expensive setting, so quality tops out below 1 even for the large model.
"""
from __future__ import annotations

import numpy as np

from repro.video.content import ContentParams
from repro.workloads.base import (
    Config,
    KnobSpec,
    TaskGraph,
    TaskNode,
    Workload,
)

_STREAM_FPS = 30.0
# Per-operator costs chosen so the most expensive configuration
# (every frame, 2x2 tiles, history 5, large TransMOT) needs ~57 core-s
# per video-second and the cheapest a fraction of a core (see
# covid.py for the calibration rationale).
_DET_S = 0.15  # detector per processed frame per tile
_EMBED_S = 0.05  # VGG embedding per processed frame
_TRANS_S = {"small": 0.08, "medium": 0.18, "large": 0.36}
_BASE_ACC = {"small": 0.80, "medium": 0.90, "large": 0.97}
_DECODE_S = 0.0016
_JPEG_BYTES = 80_000.0


class MotWorkload(Workload):
    name = "mot"
    seg_len = 2.0
    dims = ("crowd", "smallobj", "motion")
    knobs = (
        KnobSpec("frame_stride", (1, 5, 30, 60)),
        KnobSpec("tiles", (1, 4)),
        KnobSpec("history", (1, 2, 3, 5)),
        KnobSpec("model_size", ("small", "medium", "large")),
    )
    tau = 0.09
    test_days = 8.0
    train_days = 16.0

    def _proc_fps(self, cfg: Config) -> float:
        stride = cfg[0]
        return _STREAM_FPS / stride

    def base_quality(self, cfg: Config) -> float:
        return _BASE_ACC[cfg[3]]

    def capability(self, cfg: Config) -> np.ndarray:
        stride, tiles, history, model = cfg
        fps = self._proc_fps(cfg)
        model_cap = {"small": 0.42, "medium": 0.66, "large": 0.92}[model]
        cap_crowd = min(1.0, model_cap + 0.05 * (history - 1))
        cap_small = 0.40 if tiles == 1 else 0.90
        cap_motion = 0.14 + 0.86 * min(1.0, fps / 30.0) ** 0.5
        return np.array([cap_crowd, cap_small, cap_motion])

    def content_params(self) -> ContentParams:
        return ContentParams(
            dims=self.dims,
            # Traffic intersection: morning and evening rush hours.
            base=(0.08, 0.18, 0.12),
            diurnal_amp=(0.46, 0.24, 0.42),
            diurnal_peaks=((8.5, 1.6, 0.9), (18.0, 2.0, 1.0), (13.0, 2.5, 0.5)),
            burst_rate_per_hour=14.0,
            burst_scale=(1.0, 0.4, 0.9),
            burst_mag=(0.25, 0.50),
            burst_dur_s=(15.0, 75.0),
            drift_rho=0.985,
            drift_sigma=0.02,
            drift_scale=(0.7, 0.4, 0.5),
            noise_sigma=0.02,
            seg_len=self.seg_len,
        )

    def task_graph(self, cfg: Config) -> TaskGraph:
        stride, tiles, history, model = cfg
        frames_f = self._proc_fps(cfg) * self.seg_len
        frames_w = max(1, round(frames_f))
        hist_factor = 1.0 + 0.18 * (history - 1)
        per_trans = _TRANS_S[model] * hist_factor
        rtt = 0.12
        nodes = (
            TaskNode(
                "decode",
                frames_f * _DECODE_S,
                _DECODE_S,
                0.0,
                0.0,
                pin_onprem=True,
                width=frames_w,
            ),
            TaskNode(
                "detect",
                frames_f * _DET_S * tiles,
                rtt + _DET_S * tiles / 2.0,
                frames_f * _JPEG_BYTES * tiles,
                frames_f * 4_000.0,
                width=frames_w,
            ),
            TaskNode(
                "embed",
                frames_f * _EMBED_S,
                rtt + _EMBED_S / 2.0,
                frames_f * _JPEG_BYTES,
                frames_f * 8_000.0,
                width=frames_w,
            ),
            TaskNode(
                "transmot",
                frames_f * per_trans,
                rtt + per_trans / 2.0,
                frames_f * 8_000.0 * history,
                frames_f * 3_000.0,
                width=frames_w,
            ),
        )
        edges = ((0, 1), (1, 2), (2, 3))
        return TaskGraph(nodes, edges)
