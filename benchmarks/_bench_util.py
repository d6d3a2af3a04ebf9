"""Shared benchmark body: build one mode's DataFrame and execute it to a
noop sink (no driver collection)."""


def run_mode(wl, tables, mode, prepared, **kw):
    from repro import harness

    df, _ = harness.build(wl, tables, mode, prepared=prepared, **kw)
    df.write.format("noop").mode("overwrite").save()
