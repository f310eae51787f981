"""StreamTune's primary contribution: bottleneck identification
(Algorithm 1), Table I feature encoding, the GNN-based encoder with the
parallelism FUSE update, monotonic fine-tuning models, GED-clustered
pre-training, and the online tuning loop (Algorithm 2)."""
