"""Core of the reproduction: query model, matcher, engines, MS-tree, oracle SQL."""
