"""Synthetic streaming-graph workloads and §VII-B query generation."""
