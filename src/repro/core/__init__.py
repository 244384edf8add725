"""ADJ core: query model, GHD, cost model, sampler, optimizer, executor."""
