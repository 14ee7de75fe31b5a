"""CERES core: matching, topic identification, annotation, training, extraction."""
