"""Reproduction of "Generating Skyline Datasets for Data Science Models"
(MODis, EDBT 2025). See DESIGN.md for the system map and EXPERIMENTS.md
for paper-vs-measured table reproductions.
"""
__all__ = ["core", "lake", "ml", "estimator", "baselines", "measures", "tasks"]
