"""Evaluation: detection scores (IoU/EoB), clustering metrics, table harnesses."""
