"""DATAMARAN core: template model, generation, pruning, MDL evaluation,
refinement, extraction driver, and the Spark distributed dataflow."""
