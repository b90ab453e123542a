"""COVID-19 safety-measures workload (paper Section 5.2 / Appendix J).

Pipeline: YOLOv5 pedestrian detector -> KCF tracker ("detect-to-track")
-> homography distance measurement + ResNet-50 mask classifier.

Knobs (verbatim from the paper):
  * frame rate at which video is processed: {30, 15, 10, 5, 1} FPS
  * object-detection rate: run the detector every {1, 5, 30, 60} frames
  * tiling for object detection: {1x1, 2x2} tiles

Cost model constants come from the paper's measurements: YOLOv5 inference
86 ms/frame, decode 1.6 ms/frame (Appendix K.2); tracker and classifier
costs are set so that the most expensive configuration needs ~11 cores in
real time (paper: 5.2 TFLOP/s peak on the EV example, i.e. well above a
small server) and the cheapest runs on a fraction of one core.

Quality dims: ``crowd`` (occlusions, strong diurnal + bursts),
``smallobj`` (distant pedestrians, mild diurnal), ``motion`` (speed of
targets, burst-driven).  Frequent detection handles occlusions, tiling
handles small objects, high FPS handles motion — mirroring Appendix J's
description of what each knob buys.
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

# Per-operator costs.  The 86 ms YOLOv5 figure from Appendix K.2 is per
# tile at the model's native input size; detecting on an HD frame tile
# with pre/post-processing lands near 0.3 core-seconds, which puts the
# most expensive configuration (30 FPS, detect every frame, 2x2 tiles)
# at ~39 core-s per video-second — matching the paper's setting where
# only the 60-vCPU machine sustains peak quality statically.
_DET_S = 0.30  # detector per frame per tile
_TRACK_S = 0.04  # KCF tracker per frame
_MASK_S = 0.06  # mask classifier per detection frame
_DECODE_S = 0.0016  # H.264 decode per frame (paper: 1.6 ms)
_JPEG_BYTES = 80_000.0  # compressed HD frame sent to the cloud (§5.1)


class CovidWorkload(Workload):
    name = "covid"
    seg_len = 2.0
    dims = ("crowd", "smallobj", "motion")
    knobs = (
        KnobSpec("fps", (30, 15, 10, 5, 1)),
        KnobSpec("det_interval", (1, 5, 30, 60)),
        KnobSpec("tiles", (1, 4)),
    )
    tau = 0.09
    test_days = 8.0
    train_days = 16.0

    def capability(self, cfg: Config) -> np.ndarray:
        fps, det_interval, tiles = cfg
        det_per_s = fps / det_interval
        cap_crowd = 0.12 + 0.88 * min(1.0, det_per_s / 30.0) ** 0.45
        cap_small = 0.42 if tiles == 1 else 0.93
        cap_motion = 0.16 + 0.84 * (fps / 30.0) ** 0.5
        return np.array([cap_crowd, cap_small, cap_motion])

    def content_params(self) -> ContentParams:
        return ContentParams(
            dims=self.dims,
            base=(0.06, 0.20, 0.10),
            # Moderate diurnal lift: daytime content needs mid-tier
            # configurations; truly hard content (dense crowds with many
            # occlusions) comes in bursts covering ~15% of the day.
            diurnal_amp=(0.46, 0.26, 0.36),
            # Shopping-street profile: busy midday through evening.
            diurnal_peaks=((13.0, 2.6, 0.8), (18.5, 2.2, 1.0)),
            burst_rate_per_hour=14.0,
            burst_scale=(1.0, 0.35, 0.8),
            burst_mag=(0.25, 0.50),
            burst_dur_s=(15.0, 70.0),
            drift_rho=0.985,
            drift_sigma=0.02,
            drift_scale=(1.0, 0.5, 0.6),
            noise_sigma=0.02,
            seg_len=self.seg_len,
        )

    def task_graph(self, cfg: Config) -> TaskGraph:
        fps, det_interval, tiles = cfg
        # fractional frame counts keep the cost model exact for sparse
        # stages (e.g. one detection every 60 s is 1/30 per 2 s segment);
        # widths (independent sub-task counts) stay integral
        det_f = fps * self.seg_len / det_interval
        track_f = fps * self.seg_len
        det_w = max(1, round(det_f))
        track_w = max(1, round(track_f))
        rtt = 0.12  # HTTPS round trip to AWS Lambda per invocation
        nodes = (
            TaskNode(
                "decode",
                track_f * _DECODE_S,
                _DECODE_S,
                0.0,
                0.0,
                pin_onprem=True,
                width=track_w,
            ),
            TaskNode(
                "detect",
                det_f * _DET_S * tiles,
                rtt + _DET_S * tiles / 2.0,  # Lambda 3GB has 2 cores
                det_f * _JPEG_BYTES * tiles,
                det_f * 4_000.0,  # bounding boxes back
                width=det_w,
            ),
            TaskNode(
                "track",
                track_f * _TRACK_S,
                rtt + _TRACK_S / 2.0,
                track_f * _JPEG_BYTES,
                track_f * 2_000.0,
                width=track_w,
            ),
            TaskNode(
                "mask",
                det_f * _MASK_S,
                rtt + _MASK_S / 2.0,
                det_f * _JPEG_BYTES,
                det_f * 500.0,
                width=det_w,
            ),
        )
        edges = ((0, 1), (1, 2), (1, 3))
        return TaskGraph(nodes, edges)
