"""§V concurrency management: per-item wait-list locks, threaded execution,
and a discrete-event schedule simulator for the speedup experiments."""
