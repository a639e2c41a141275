"""CIAO core: predicate engine, selection optimiser, cost model, storage."""
