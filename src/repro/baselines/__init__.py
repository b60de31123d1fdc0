"""Comparison systems rebuilt from their papers (§VII-C): SJ-tree, IncMat×3."""
