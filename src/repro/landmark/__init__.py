"""Landmark shortest-path indices maintained with Diff-IFE (§6.6)."""
from repro.landmark.index import LandmarkIndex, run_landmark_experiment  # noqa: F401
