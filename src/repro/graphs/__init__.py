"""Dataflow DAG structures, Graph Edit Distance, similarity search and
GED-based k-means clustering (StreamTune §IV-C)."""
