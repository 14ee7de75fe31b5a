"""Comparison systems: Vertex++, CERES-Baseline, page clustering."""
